"""Tie-in tests: TPC-H-lite generators -> graph layer -> k-core, with
DuckDB-oracle checks along the way."""
import numpy as np
import pandas as pd
import pytest

from repro import synth_data
from repro.graphs import generators as gen
from repro.graphs.spark_graph import bipartite_edges_from_lineitem, symmetrize
from repro.oracle import assert_equivalent
from repro.seq.bz import bz_kcore
from repro.simcpu import run_kcore
from repro.simcpu.configs import OURS


def test_lineitem_deterministic(spark):
    a = synth_data.lineitem(spark, sf=0.001, seed=5).toPandas()
    b = synth_data.lineitem(spark, sf=0.001, seed=5).toPandas()
    pd.testing.assert_frame_equal(a, b)


def test_order_part_degree_oracle(spark):
    """Part 'degree' (distinct orders containing it) via Spark vs DuckDB."""
    li = synth_data.lineitem(spark, sf=0.002, seed=2)
    edges = bipartite_edges_from_lineitem(li)
    from pyspark.sql import functions as F

    deg = edges.groupBy(F.col("dst").alias("part_id")).agg(
        F.count("*").alias("n_orders")
    )
    n_orders = li.agg(F.max("l_orderkey")).collect()[0][0]
    assert_equivalent(
        deg,
        f"""
        SELECT l_partkey - 1 + {n_orders} AS part_id,
               count(DISTINCT l_orderkey) AS n_orders
        FROM li GROUP BY l_partkey
        """,
        li=li,
    )


def test_kcore_of_tpch_bipartite_graph(spark):
    """Full pipeline: lineitem -> bipartite graph -> k-core (simulator
    'ours' config) == BZ ground truth."""
    li_pdf = synth_data.lineitem(spark, sf=0.002, seed=3).toPandas()
    g = gen.bipartite_from_lineitem(li_pdf)
    truth = bz_kcore(g).core
    core, met = run_kcore(g, OURS)
    assert np.array_equal(core, truth)
    assert met.kmax == truth.max()


def test_zipf_keys_available_for_skew_workloads(spark):
    df = synth_data.zipf_keys(spark, n=5000, n_keys=100, seed=1)
    top = (
        df.groupBy("k").count().orderBy("count", ascending=False).limit(1).toPandas()
    )
    assert top["count"].iloc[0] > 5000 / 100 * 5  # heavy head
