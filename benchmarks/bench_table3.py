"""Benchmark for Table 3: all 8 {VGC, sampling, HBS} combinations on
every suite graph; writes results/table3.csv."""
import pathlib

import pytest

from repro.tables import table3

RESULTS = pathlib.Path(__file__).resolve().parent.parent / "results"


@pytest.mark.benchmark(group="table3")
def test_bench_table3(benchmark, spark):
    df = benchmark.pedantic(lambda: table3.compute(spark), rounds=1, iterations=1)
    RESULTS.mkdir(exist_ok=True)
    df.to_csv(RESULTS / "table3.csv", index=False)
    by = df.set_index("graph")
    # Paper shapes: VGC dominates on lattice/mesh graphs, sampling on
    # hub-heavy dense graphs, and the full design is never far from the
    # per-graph best combination.
    assert by.loc["GRID", "vgc"] < by.loc["GRID", "plain"] / 2
    assert by.loc["TW", "sample"] < by.loc["TW", "plain"]
    assert (df["norm_vgc+sample+hbs"] < 2.2).all()
