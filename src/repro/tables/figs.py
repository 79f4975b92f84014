"""Figure-equivalent experiments, rendered as tables (figures are out
of scope): Fig. 7 (subrounds with/without VGC), Fig. 8 (bucketing
strategies), Fig. 9/14 (burdened span vs Julienne), Fig. 11 (sampling
on/off), Fig. 12 (max k'-core subgraph vs Galois)."""
from __future__ import annotations

import pandas as pd
from pyspark.sql import SparkSession

from repro.graphs.suite import REPRESENTATIVE, SAMPLING_GRAPHS, SUITE, load_graph
from repro.simcpu.machine import MachineConfig
from repro.tables.runner import run_cells


def fig7_subrounds(
    spark: SparkSession,
    *,
    graphs: list[str] | None = None,
    scale: str = "bench",
    machine: MachineConfig | None = None,
) -> pd.DataFrame:
    """rho (no VGC) vs rho' (VGC) and the reduction ratio R."""
    graphs = graphs or REPRESENTATIVE
    cells = [
        {"graph": g, "algo": a, "scale": scale}
        for g in graphs
        for a in ("plain", "vgc")
    ]
    raw = run_cells(spark, cells, machine)
    rows = []
    for g in graphs:
        sub = raw[raw.graph == g].set_index("algo")
        rho, rho_p = int(sub.loc["plain", "rho"]), int(sub.loc["vgc", "rho"])
        rows.append(
            {
                "graph": g,
                "rho": rho,
                "rho_vgc": rho_p,
                "reduction": rho / rho_p if rho_p else float("nan"),
            }
        )
    return pd.DataFrame(rows)


def fig8_buckets(
    spark: SparkSession,
    *,
    graphs: list[str] | None = None,
    scale: str = "bench",
    machine: MachineConfig | None = None,
) -> pd.DataFrame:
    """1 bucket vs 16 buckets vs HBS (ours with VGC+sampling),
    normalized to HBS (lower is better, as in Fig. 8)."""
    graphs = graphs or REPRESENTATIVE
    algos = ["buckets-single", "buckets-fixed", "buckets-adaptive"]
    cells = [{"graph": g, "algo": a, "scale": scale} for g in graphs for a in algos]
    raw = run_cells(spark, cells, machine)
    rows = []
    for g in graphs:
        sub = raw[raw.graph == g].set_index("algo")["t_par"]
        hbs = sub["buckets-adaptive"]
        rows.append(
            {
                "graph": g,
                "one_bucket": sub["buckets-single"],
                "16_buckets": sub["buckets-fixed"],
                "hbs": hbs,
                "rel_one": sub["buckets-single"] / hbs,
                "rel_16": sub["buckets-fixed"] / hbs,
            }
        )
    return pd.DataFrame(rows)


def fig9_burdened_span(
    spark: SparkSession,
    *,
    graphs: list[str] | None = None,
    scale: str = "bench",
    machine: MachineConfig | None = None,
) -> pd.DataFrame:
    """Burdened-span speedup of ours (with/without VGC, 16 buckets as
    in the paper's Fig. 14 setup) over Julienne; also the time speedup
    (Fig. 15 counterpart)."""
    graphs = graphs or list(SUITE)
    algos = ["julienne", "ours-novgc-f16", "ours-vgc-f16"]
    cells = [{"graph": g, "algo": a, "scale": scale} for g in graphs for a in algos]
    raw = run_cells(spark, cells, machine)
    rows = []
    for g in graphs:
        sub = raw[raw.graph == g].set_index("algo")
        jb, jt = sub.loc["julienne", "bspan"], sub.loc["julienne", "t_par"]
        rows.append(
            {
                "graph": g,
                "bspan_speedup_novgc": jb / sub.loc["ours-novgc-f16", "bspan"],
                "bspan_speedup_vgc": jb / sub.loc["ours-vgc-f16", "bspan"],
                "time_speedup_novgc": jt / sub.loc["ours-novgc-f16", "t_par"],
                "time_speedup_vgc": jt / sub.loc["ours-vgc-f16", "t_par"],
            }
        )
    return pd.DataFrame(rows)


def fig11_sampling(
    spark: SparkSession,
    *,
    graphs: list[str] | None = None,
    scale: str = "bench",
    machine: MachineConfig | None = None,
) -> pd.DataFrame:
    """Ours with vs without sampling on the graphs that trigger it."""
    graphs = graphs or SAMPLING_GRAPHS
    cells = [
        {"graph": g, "algo": a, "scale": scale}
        for g in graphs
        for a in ("ours", "ours-nosample")
    ]
    raw = run_cells(spark, cells, machine)
    rows = []
    for g in graphs:
        sub = raw[raw.graph == g].set_index("algo")
        rows.append(
            {
                "graph": g,
                "with_sampling": sub.loc["ours", "t_par"],
                "without_sampling": sub.loc["ours-nosample", "t_par"],
                "speedup": sub.loc["ours-nosample", "t_par"] / sub.loc["ours", "t_par"],
                "n_sampled": int(sub.loc["ours", "n_sampled"]),
                "cmax_with": int(sub.loc["ours", "max_contention"]),
                "cmax_without": int(sub.loc["ours-nosample", "max_contention"]),
            }
        )
    return pd.DataFrame(rows)


def fig12_subgraph(
    *,
    graphs: list[str] | None = None,
    ks: list[int] | None = None,
    scale: str = "bench",
    machine: MachineConfig | None = None,
) -> pd.DataFrame:
    """Max k'-core subgraph: ours-adapted vs the Galois-like baseline.

    The paper sweeps k in 16..2048 on OK and TW; our analogues have
    proportionally smaller k_max, so the default sweep is scaled to
    4..128. Runs driver-side (few cells, each cheap)."""
    from repro.core.subgraph import kcore_subgraph, kcore_subgraph_galois

    machine = machine or MachineConfig()
    graphs = graphs or ["OK", "TW"]
    ks = ks or [4, 8, 16, 32, 64, 128]
    rows = []
    for gname in graphs:
        g = load_graph(gname, scale)
        for k in ks:
            ours_mask, ours_met = kcore_subgraph(g, k, machine=machine)
            gal_mask, gal_met = kcore_subgraph_galois(g, k, machine=machine)
            assert (ours_mask == gal_mask).all()
            rows.append(
                {
                    "graph": gname,
                    "k": k,
                    "core_size": int(ours_mask.sum()),
                    "ours": ours_met.t_par_seconds(machine),
                    "galois": gal_met.t_par_seconds(machine),
                    "speedup": gal_met.t_par_units / ours_met.t_par_units
                    if ours_met.t_par_units
                    else float("nan"),
                }
            )
    return pd.DataFrame(rows)
