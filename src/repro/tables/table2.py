"""Table 2: overall performance of ours vs BZ / Julienne / ParK / PKC.

For each suite graph we report the analogue's (n, m, k_max, rho), the
simulated sequential time of our plain framework ("seq."), our parallel
time ("par."), the self-relative speedup, and the simulated times of
the four baselines — next to the paper's numbers, so the shape (who
wins, by roughly what factor) can be diffed directly.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import SparkSession

from repro.graphs.suite import SUITE
from repro.simcpu.machine import MachineConfig
from repro.tables.runner import run_cells

ALGOS = ["plain", "bz", "julienne", "park", "pkc", "ours"]


def compute(
    spark: SparkSession,
    *,
    graphs: list[str] | None = None,
    scale: str = "bench",
    machine: MachineConfig | None = None,
) -> pd.DataFrame:
    """One row per graph with measured + paper columns."""
    graphs = graphs or list(SUITE)
    machine = machine or MachineConfig()
    cells = [{"graph": g, "algo": a, "scale": scale} for g in graphs for a in ALGOS]
    raw = run_cells(spark, cells, machine)
    rows = []
    for g in graphs:
        sub = raw[raw.graph == g].set_index("algo")
        spec = SUITE[g]
        par = sub.loc["ours", "t_par"]
        seq = sub.loc["plain", "t_seq"]
        row = {
            "graph": g,
            "category": spec.category,
            "n": int(sub.loc["ours", "n"]),
            "m": int(sub.loc["ours", "m"]),
            "kmax": int(sub.loc["ours", "kmax"]),
            "rho": int(sub.loc["plain", "rho"]),
            "seq": seq,
            "par": par,
            "spd": seq / par if par else float("nan"),
            "bz": sub.loc["bz", "t_seq"],
            "julienne": sub.loc["julienne", "t_par"],
            "park": sub.loc["park", "t_par"],
            "pkc": sub.loc["pkc", "t_par"],
        }
        for col in ("n", "m", "kmax", "rho", "seq", "par", "bz", "julienne", "park", "pkc"):
            row[f"paper_{col}"] = spec.paper.get(col)
        rows.append(row)
    return pd.DataFrame(rows)


def render(df: pd.DataFrame) -> str:
    """Paper-style text table (simulated seconds)."""
    lines = [
        f"{'graph':6s} {'n':>8s} {'m':>9s} {'kmax':>6s} {'rho':>6s} "
        f"{'seq':>9s} {'par':>9s} {'spd':>6s} {'BZ':>9s} {'Julienne':>9s} "
        f"{'ParK':>9s} {'PKC':>9s}  best"
    ]
    for _, r in df.iterrows():
        algs = {"ours": r["par"], "julienne": r["julienne"], "park": r["park"], "pkc": r["pkc"]}
        best = min(algs, key=algs.get)
        lines.append(
            f"{r['graph']:6s} {r['n']:8d} {r['m']:9d} {r['kmax']:6d} {r['rho']:6d} "
            f"{r['seq']:9.4f} {r['par']:9.4f} {r['spd']:6.1f} {r['bz']:9.4f} "
            f"{r['julienne']:9.4f} {r['park']:9.4f} {r['pkc']:9.4f}  {best}"
        )
    return "\n".join(lines)
