"""spark-submit entrypoint for Table 3 (technique combinations).

    spark-submit jobs/table3.py [--scale mini|bench]
"""
import argparse

from _common import get_spark, save

from repro.tables import table3


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--scale", default="bench", choices=["mini", "bench"])
    args = ap.parse_args()
    spark = get_spark("table3")
    df = table3.compute(spark, scale=args.scale)
    print("raw simulated seconds:")
    print(table3.render(df, normalized=False))
    print("\nnormalized to per-graph best (paper Fig. 13 heatmap):")
    print(table3.render(df, normalized=True))
    save(df, "table3.csv")


if __name__ == "__main__":
    main()
