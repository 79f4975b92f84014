"""Alg. 1 (work-efficient peeling framework) as a Spark DataFrame program.

The offline peel of a subround is *literally* Julienne's
histogram-based Alg. 2 in Catalyst terms:

    decr = edges JOIN frontier ON src GROUPBY dst COUNT   -- HISTOGRAM
    deg  = deg - coalesce(decr, 0)                        -- batch apply
    next = ACTIVE vertices with deg <= k                  -- PACK

The active set is the rows with ``core == -1``; the per-round
refinement (line 9 of Alg. 1) is the frontier filter itself. With
``bucket_width`` b > 1, a candidate pool (all active vertices with
deg < k + b) is materialized every b rounds and frontiers are drawn
from the pool — Julienne's fixed-b bucketing expressed as a cached
DataFrame, reducing full-table scans by a factor of b. Mirroring
Julienne's DecreaseKey, every vertex whose degree is decremented is
inserted into the pool, so a vertex that falls into the pool's range
between rebuilds is still peeled in the correct round.

Returns exact coreness; every iteration is a Spark job, so use
test-scale graphs (the machine simulator covers benchmark scale).
"""
from __future__ import annotations

from dataclasses import dataclass, field

from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.graphs.spark_graph import degrees


@dataclass
class DataflowStats:
    """Execution-structure measurements of a dataflow run."""

    rounds: int = 0
    subrounds: int = 0
    subrounds_per_round: list = field(default_factory=list)
    pool_builds: int = 0


def kcore_dataflow(
    spark: SparkSession,
    edges: DataFrame,
    *,
    bucket_width: int = 1,
    checkpoint_every: int = 8,
    max_iterations: int = 10_000,
) -> tuple[DataFrame, DataflowStats]:
    """Exact k-core decomposition of a symmetric edge DataFrame.

    Returns ((id, coreness) DataFrame, stats). ``bucket_width`` = 1 is
    the plain single-bucket framework; > 1 is the Julienne-style pool.
    """
    assert bucket_width >= 1
    edges = edges.select("src", "dst").cache()
    state = degrees(edges).withColumn("core", F.lit(-1)).localCheckpoint()
    stats = DataflowStats()
    k = 0
    pool = None
    pool_base = -1
    iters = 0
    while True:
        remaining = state.where(F.col("core") == -1)
        if remaining.isEmpty():
            break
        if bucket_width > 1:
            if pool is None or k >= pool_base + bucket_width:
                pool_base = k
                pool = (
                    remaining.where(F.col("deg") < k + bucket_width)
                    .select("id")
                    .localCheckpoint()
                )
                stats.pool_builds += 1
            candidates = state.join(pool.distinct(), "id").where(F.col("core") == -1)
        else:
            candidates = remaining
        frontier = candidates.where(F.col("deg") <= k).select("id").localCheckpoint()
        sub = 0
        while not frontier.isEmpty():
            iters += 1
            sub += 1
            if iters > max_iterations:
                raise RuntimeError("dataflow peeling exceeded iteration budget")
            # Set coreness of the frontier (line 7 of Alg. 1).
            state = state.join(
                frontier.withColumn("is_f", F.lit(1)), "id", "left"
            ).select(
                "id",
                "deg",
                F.when(F.col("is_f") == 1, k).otherwise(F.col("core")).alias("core"),
            )
            # Offline peel: histogram of neighbor occurrences (Alg. 2).
            decr = (
                edges.join(frontier.withColumnRenamed("id", "src"), "src")
                .groupBy(F.col("dst").alias("id"))
                .agg(F.count("*").alias("c"))
            )
            state = state.join(decr, "id", "left").select(
                "id",
                (F.col("deg") - F.coalesce(F.col("c"), F.lit(0))).alias("deg"),
                "core",
            )
            if bucket_width > 1:
                # DecreaseKey: decremented vertices (re)enter the pool.
                pool = pool.unionByName(decr.select("id")).localCheckpoint()
            if sub % checkpoint_every == 0:
                state = state.localCheckpoint()
            source = (
                state.join(pool.distinct(), "id") if bucket_width > 1 else state
            )
            frontier = (
                source.where((F.col("core") == -1) & (F.col("deg") <= k))
                .select("id")
                .localCheckpoint()
            )
        state = state.localCheckpoint()
        stats.rounds += 1
        stats.subrounds += sub
        stats.subrounds_per_round.append(sub)
        k += 1
    result = state.select("id", F.col("core").alias("coreness"))
    return result, stats
