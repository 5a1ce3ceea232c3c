"""T8 (Fig. 11): extra space + offline-time amortization over 9 rounds.

Usage: python jobs/exp_overhead.py [--sf 0.02] [--rounds 9]
"""
import argparse

from _session import get_spark


def main():
    ap = argparse.ArgumentParser()
    ap.add_argument("--sf", type=float, default=0.02)
    ap.add_argument("--rounds", type=int, default=9)
    ap.add_argument("--algo", default="pagerank")
    args = ap.parse_args()
    spark = get_spark(app="exp-overhead")
    from repro.experiments import overhead

    space = overhead.run_space(spark, sf=args.sf)
    amort = overhead.run_amortization(
        spark, sf=args.sf, rounds=args.rounds, algo_name=args.algo
    )
    print(overhead.report(space, amort))
    spark.stop()


if __name__ == "__main__":
    main()
