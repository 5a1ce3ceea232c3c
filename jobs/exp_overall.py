"""T2 (Fig. 5a-d + Fig. 6): overall performance of all systems.

Usage: python jobs/exp_overall.py [--sf 0.02] [--datasets uk_lite ...]
       [--algos sssp ...] [--tol 1e-6]
"""
import argparse

from _session import get_spark


def main():
    ap = argparse.ArgumentParser()
    ap.add_argument("--sf", type=float, default=0.02)
    ap.add_argument("--datasets", nargs="*", default=None)
    ap.add_argument("--algos", nargs="*", default=None)
    ap.add_argument("--systems", nargs="*", default=None)
    ap.add_argument("--tol", type=float, default=1e-6)
    args = ap.parse_args()
    spark = get_spark(app="exp-overall")
    from repro.experiments import overall

    df = overall.run(
        spark, sf=args.sf, datasets=args.datasets, algos=args.algos,
        systems=args.systems, tol=args.tol,
    )
    print(overall.report(df))
    spark.stop()


if __name__ == "__main__":
    main()
