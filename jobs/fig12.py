"""Entrypoint for the Fig. 12 table (max k'-core subgraph vs the
Galois-like baseline). Runs driver-side; no cluster needed."""
from _common import save

from repro.tables import figs


def main() -> None:
    df = figs.fig12_subgraph()
    print(df.to_string(index=False))
    save(df, "fig12.csv")


if __name__ == "__main__":
    main()
