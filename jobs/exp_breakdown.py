"""T4 (Fig. 7): Layph per-phase runtime breakdown on UK.

Usage: python jobs/exp_breakdown.py [--sf 0.02]
"""
import argparse

from _session import get_spark


def main():
    ap = argparse.ArgumentParser()
    ap.add_argument("--sf", type=float, default=0.02)
    ap.add_argument("--ds", default="uk_lite")
    args = ap.parse_args()
    spark = get_spark(app="exp-breakdown")
    from repro.experiments import breakdown

    df = breakdown.run(spark, sf=args.sf, ds=args.ds)
    print(breakdown.report(df))
    spark.stop()


if __name__ == "__main__":
    main()
