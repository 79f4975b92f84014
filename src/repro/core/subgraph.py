"""Maximum k'-core subgraph (paper Appendix B / Fig. 12).

Given k', iteratively delete vertices with induced degree < k' until
none remain; the survivors form the maximum k'-core subgraph. The
paper adapts its framework (online peel + VGC + sampling) to this
problem and compares against Galois [60], an asynchronous
worklist-based system.

We implement:

- ``kcore_subgraph``        ours-adapted: online subround peeling with
  VGC local queues and the sampling scheme, on the machine simulator's
  cost model (one "round", many subrounds).
- ``kcore_subgraph_galois`` the Galois-like baseline: an asynchronous
  worklist — no subround barriers (no omega per subround), but every
  activated task pays Galois's per-activity worklist overhead and full
  atomic contention on high-degree vertices (no sampling). This models
  the system the paper measured; Galois itself is closed-source-ish
  C++ we cannot run here (substitution documented in DESIGN.md).
- ``kcore_subgraph_dataflow`` a DataFrame fixpoint (filter + histogram
  loop) used for oracle checking in tests.

All three return the same exact membership mask.
"""
from __future__ import annotations

from dataclasses import replace

import numpy as np
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.graphs.csr import CSR
from repro.simcpu.engine import AlgoConfig, _Engine
from repro.simcpu.machine import MachineConfig
from repro.simcpu.metrics import RunMetrics


def _peel_below(
    g: CSR, kprime: int, algo: AlgoConfig, machine: MachineConfig
) -> tuple[np.ndarray, RunMetrics]:
    """Run the engine but stop after round k'-1: everything with
    coreness < k' is peeled; survivors are the k'-core."""
    eng = _Engine(g, algo, machine, collect=False)
    build_cost = eng.structure.build(np.arange(g.n, dtype=np.int64), eng.deg)
    eng._charge_parallel(build_cost, 1)
    if algo.sampling:
        eng._set_sampler(np.arange(g.n, dtype=np.int64), 0)
        eng._charge_parallel(float(g.n), 1)
    for k in range(kprime):
        if not (eng.state != 2).any():
            break  # everything peeled: the k'-core is empty
        frontier, cost = eng.structure.next_frontier(k, eng.deg, eng.state)
        eng._charge_parallel(cost, 1)
        if algo.sampling:
            joins = eng._validate(k)
            if len(joins):
                frontier = np.unique(np.concatenate([frontier, joins]))
        eng.state[frontier] = 1
        while len(frontier):
            eng.core[frontier] = k
            eng.state[frontier] = 2
            eng.met.rho += 1
            if algo.vgc:
                frontier, _ = eng._peel_local(frontier, k, per_thread=False)
            else:
                frontier = eng._peel_batch(frontier, k)
        eng.met.rounds += 1
    member = eng.state != 2
    eng.met.t_seq_units = eng.met.work * machine.t_op
    return member, eng.met


def kcore_subgraph(
    g: CSR,
    kprime: int,
    *,
    machine: MachineConfig | None = None,
    vgc: bool = True,
    sampling: bool = True,
    seed: int = 42,
) -> tuple[np.ndarray, RunMetrics]:
    """Ours-adapted max k'-core (membership mask, metrics)."""
    machine = machine or MachineConfig()
    algo = AlgoConfig(
        name="ours-subgraph",
        structure="adaptive",
        vgc=vgc,
        sampling=sampling,
        seed=seed,
    )
    member, met = _peel_below(g, kprime, algo, machine)
    if sampling:
        # Las Vegas check: survivors must all have >= k' surviving
        # neighbors; otherwise rerun without sampling.
        if not _is_kcore(g, member, kprime):
            member, met = _peel_below(
                g, kprime, replace(algo, sampling=False), machine
            )
            met.restarts = 1
    return member, met


def kcore_subgraph_galois(
    g: CSR, kprime: int, *, machine: MachineConfig | None = None, t_task: float = 12.0
) -> tuple[np.ndarray, RunMetrics]:
    """Galois-like asynchronous worklist baseline.

    Executes the same peeling (so the mask is exact), but the cost
    model has no subround syncs: time = work/P + per-activity worklist
    overhead (t_task per processed vertex) + full contention serialized
    on the hottest location (no sampling)."""
    machine = machine or MachineConfig()
    algo = AlgoConfig(name="galois", structure="single", vgc=False, sampling=False)
    member, met = _peel_below(g, kprime, algo, machine)
    # Re-price: remove the per-subround omega charges, add worklist
    # overhead per activation and keep the serialized contention.
    n_activated = int((~member).sum())
    met.t_par_units += n_activated * t_task / machine.p
    met.t_par_units -= met.rho * machine.omega  # async: no barriers
    met.algo = "galois"
    return member, met


def _is_kcore(g: CSR, member: np.ndarray, kprime: int) -> bool:
    """Every member has >= k' member neighbors, and the peeled part is
    certified by re-peeling (used as the sampling recovery check)."""
    if not member.any():
        return True
    src = np.repeat(np.arange(g.n), np.diff(g.indptr))
    both = member[src] & member[g.adj]
    deg_in = np.bincount(src[both], minlength=g.n)
    return bool((deg_in[member] >= kprime).all())


def kcore_subgraph_dataflow(
    spark: SparkSession, edges: DataFrame, kprime: int, *, max_iterations: int = 2000
) -> DataFrame:
    """DataFrame fixpoint: drop vertices with degree < k' until stable.
    Returns the (id) DataFrame of the maximum k'-core members."""
    live = edges.select("src", "dst").localCheckpoint()
    for _ in range(max_iterations):
        deg = live.groupBy("src").agg(F.count("*").alias("deg"))
        keep = deg.where(F.col("deg") >= kprime).select("src").localCheckpoint()
        nxt = (
            live.join(keep, "src")
            .join(keep.withColumnRenamed("src", "dst"), "dst")
            .select("src", "dst")
            .localCheckpoint()
        )
        if nxt.count() == live.count():
            return keep.select(F.col("src").alias("id"))
        live = nxt
    raise RuntimeError("k-core subgraph fixpoint did not converge")
