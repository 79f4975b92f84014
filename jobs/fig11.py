"""spark-submit entrypoint for the Fig. 11 table (sampling on/off)."""
from _common import get_spark, save

from repro.tables import figs


def main() -> None:
    spark = get_spark("fig11")
    df = figs.fig11_sampling(spark)
    print(df.to_string(index=False))
    save(df, "fig11.csv")


if __name__ == "__main__":
    main()
