"""T6 (Fig. 10): speedup vs ΔG batch size on UK.

Usage: python jobs/exp_batch_size.py [--sf 0.02]
"""
import argparse

from _session import get_spark


def main():
    ap = argparse.ArgumentParser()
    ap.add_argument("--sf", type=float, default=0.02)
    ap.add_argument("--algos", nargs="*", default=None)
    ap.add_argument("--ratios", nargs="*", type=float, default=None)
    ap.add_argument("--systems", nargs="*", default=None)
    args = ap.parse_args()
    spark = get_spark(app="exp-batch-size")
    from repro.experiments import batch_size

    df = batch_size.run(
        spark, sf=args.sf, algos=args.algos, ratios=args.ratios, systems=args.systems
    )
    print(batch_size.report(df))
    spark.stop()


if __name__ == "__main__":
    main()
