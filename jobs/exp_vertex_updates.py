"""T3 (Fig. 5e): vertex-update batches, Ingress vs Layph.

Usage: python jobs/exp_vertex_updates.py [--sf 0.02]
"""
import argparse

from _session import get_spark


def main():
    ap = argparse.ArgumentParser()
    ap.add_argument("--sf", type=float, default=0.02)
    ap.add_argument("--tol", type=float, default=1e-6)
    ap.add_argument("--datasets", nargs="*", default=None)
    ap.add_argument("--algos", nargs="*", default=None)
    args = ap.parse_args()
    spark = get_spark(app="exp-vertex-updates")
    from repro.experiments import overall

    df = overall.run(
        spark, sf=args.sf, delta_kind="vertices", tol=args.tol,
        datasets=args.datasets, algos=args.algos,
    )
    print(overall.report(df))
    spark.stop()


if __name__ == "__main__":
    main()
