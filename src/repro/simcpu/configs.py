"""Algorithm configurations for the paper's systems and ablations.

- ``OURS``       final design: online + active set + sampling + VGC +
                 adaptive HBS (Sec. 4, 5.3).
- ``JULIENNE``   offline histogram peel + active set + 16 fixed buckets
                 (work-efficient per the paper's Sec. 3.2 analysis).
- ``PARK``       online, *no* active set (O(m + k_max n) work), plain
                 subrounds.
- ``PKC``        online, no active set, unbounded thread-local buffers
                 (one subround per round, load-imbalance-prone).
- ``ours_variant(vgc, sampling, hbs)``  the 8 combos of Table 3; HBS
                 off means the plain single-bucket framework of Alg. 1.
"""
from __future__ import annotations

from dataclasses import replace

from repro.simcpu.engine import AlgoConfig

OURS = AlgoConfig(
    name="ours",
    peel="online",
    active_set=True,
    structure="adaptive",
    vgc=True,
    sampling=True,
)

OURS_PLAIN = AlgoConfig(
    name="plain", peel="online", active_set=True, structure="single"
)

JULIENNE = AlgoConfig(
    name="julienne", peel="offline", active_set=True, structure="fixed", b=16
)

PARK = AlgoConfig(name="park", peel="online", active_set=False)

PKC = AlgoConfig(name="pkc", peel="online", active_set=False, local_buffer=True)


def ours_variant(*, vgc: bool, sampling: bool, hbs: bool, seed: int = 42) -> AlgoConfig:
    """One of the 8 technique combinations evaluated in Table 3."""
    parts = [p for p, on in (("vgc", vgc), ("sample", sampling), ("hbs", hbs)) if on]
    return AlgoConfig(
        name="+".join(parts) if parts else "plain",
        peel="online",
        active_set=True,
        structure="adaptive" if hbs else "single",
        vgc=vgc,
        sampling=sampling,
        seed=seed,
    )


def bucket_variant(structure: str) -> AlgoConfig:
    """Fig. 8: ours (VGC+sampling) with 1 / 16 / hierarchical buckets."""
    assert structure in ("single", "fixed", "adaptive", "hbs")
    return replace(OURS, structure=structure, name=f"buckets-{structure}")


ALL_COMBOS = [
    ours_variant(vgc=v, sampling=s, hbs=h)
    for v in (False, True)
    for s in (False, True)
    for h in (False, True)
]
