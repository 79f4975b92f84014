"""spark-submit entrypoint for Table 2 (overall performance).

    spark-submit jobs/table2.py [--scale mini|bench]
"""
import argparse

from _common import get_spark, save

from repro.tables import table2


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--scale", default="bench", choices=["mini", "bench"])
    args = ap.parse_args()
    spark = get_spark("table2")
    df = table2.compute(spark, scale=args.scale)
    print(table2.render(df))
    save(df, "table2.csv")


if __name__ == "__main__":
    main()
