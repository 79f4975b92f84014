"""spark-submit entrypoint for the Fig. 9/14/15 table (burdened span
and time speedup over Julienne, with and without VGC)."""
from _common import get_spark, save

from repro.tables import figs


def main() -> None:
    spark = get_spark("fig9")
    df = figs.fig9_burdened_span(spark)
    print(df.to_string(index=False))
    save(df, "fig9.csv")


if __name__ == "__main__":
    main()
