"""T1 (Table I analog): dataset statistics. Usage: python jobs/exp_datasets.py [--sf 0.02]"""
import argparse

from _session import get_spark


def main():
    ap = argparse.ArgumentParser()
    ap.add_argument("--sf", type=float, default=0.02)
    args = ap.parse_args()
    spark = get_spark(app="exp-datasets")
    from repro.experiments import datasets_table

    df = datasets_table.run(spark, sf=args.sf)
    print(datasets_table.report(df))
    spark.stop()


if __name__ == "__main__":
    main()
