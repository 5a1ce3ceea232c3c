"""T7 (Fig. 8): effect of vertex replication on sizes and runtimes.

Usage: python jobs/exp_replication.py [--sf 0.02]
"""
import argparse

from _session import get_spark


def main():
    ap = argparse.ArgumentParser()
    ap.add_argument("--sf", type=float, default=0.02)
    ap.add_argument("--datasets", nargs="*", default=None)
    ap.add_argument("--algos", nargs="*", default=None)
    args = ap.parse_args()
    spark = get_spark(app="exp-replication")
    from repro.experiments import replication

    df = replication.run(spark, sf=args.sf, datasets=args.datasets, algos=args.algos)
    print(replication.report(df))
    spark.stop()


if __name__ == "__main__":
    main()
