"""spark-submit entrypoint for the Fig. 8 table (bucket strategies)."""
from _common import get_spark, save

from repro.tables import figs


def main() -> None:
    spark = get_spark("fig8")
    df = figs.fig8_buckets(spark)
    print(df.to_string(index=False))
    save(df, "fig8.csv")


if __name__ == "__main__":
    main()
