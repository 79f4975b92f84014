"""spark-submit entrypoint for the Fig. 7 table (rho vs rho')."""
from _common import get_spark, save

from repro.tables import figs


def main() -> None:
    spark = get_spark("fig7")
    df = figs.fig7_subrounds(spark)
    print(df.to_string(index=False))
    save(df, "fig7.csv")


if __name__ == "__main__":
    main()
