"""T5 (Fig. 9): thread scaling.

With ``--threads k`` this builds its own ``local[k]`` session (true worker
scaling, one process per invocation — run it once per k); without it, the
in-session sweep varies the superstep shuffle-partition count as a proxy.

Usage: python jobs/exp_threads.py [--threads 4] [--sf 0.02]
"""
import argparse

from _session import get_spark


def main():
    ap = argparse.ArgumentParser()
    ap.add_argument("--sf", type=float, default=0.02)
    ap.add_argument("--threads", type=int, default=None)
    ap.add_argument("--algos", nargs="*", default=None)
    args = ap.parse_args()
    master = f"local[{args.threads}]" if args.threads else None
    spark = get_spark(master=master, app="exp-threads")
    from repro.experiments import threads

    parts = [args.threads] if args.threads else None
    df = threads.run(spark, sf=args.sf, partition_counts=parts, algos=args.algos)
    if args.threads:
        df["threads"] = args.threads
    print(threads.report(df))
    spark.stop()


if __name__ == "__main__":
    main()
