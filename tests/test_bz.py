"""BZ sequential algorithm and the coreness verifier."""
import numpy as np
import pytest

from repro.graphs import generators as gen
from repro.graphs.csr import build_csr, from_edge_list
from repro.seq.bz import bz_kcore, coreness, verify_coreness


def _reference_peeling(g):
    """Independent O(n^2)-ish reference: repeatedly peel min degrees."""
    deg = g.degrees().astype(np.int64)
    alive = np.ones(g.n, dtype=bool)
    core = np.zeros(g.n, dtype=np.int64)
    k = 0
    while alive.any():
        while True:
            f = np.flatnonzero(alive & (deg <= k))
            if len(f) == 0:
                break
            core[f] = k
            alive[f] = False
            for v in f:
                for u in g.neighbors(v):
                    if alive[u]:
                        deg[u] -= 1
        k += 1
    return core


@pytest.mark.parametrize(
    "maker",
    [
        lambda: gen.grid_2d(9, 9),
        lambda: gen.honeycomb(8, 8),
        lambda: gen.chung_lu(300, 8, seed=1),
        lambda: gen.barabasi_albert(200, 3, seed=2),
        lambda: gen.hcns(25),
        lambda: gen.cube_3d(5),
        lambda: gen.knn_graph(150, 3, seed=4),
    ],
    ids=["grid", "honeycomb", "chung_lu", "ba", "hcns", "cube", "knn"],
)
def test_bz_matches_reference(maker):
    g = maker()
    res = bz_kcore(g)
    assert np.array_equal(res.core, _reference_peeling(g))
    assert res.work > g.n + g.m_directed  # touches every vertex and edge


def test_bz_empty_and_singleton():
    g = from_edge_list(np.empty((0, 2)), n=3)
    assert bz_kcore(g).core.tolist() == [0, 0, 0]


def test_bz_clique():
    n = 12
    src, dst = np.meshgrid(np.arange(n), np.arange(n))
    g = build_csr(n, src.ravel(), dst.ravel())
    assert (bz_kcore(g).core == n - 1).all()


def test_verifier_accepts_truth():
    g = gen.chung_lu(400, 10, seed=9)
    assert verify_coreness(g, coreness(g))


def test_verifier_accepts_deflation_fixpoints():
    """All-zeros is a (deflated) h-fixpoint and passes — harmless: the
    verifier only needs to reject *inflations*, the only error direction
    a missed peel can produce (see seq/bz.py docstring)."""
    g = gen.grid_2d(6, 6)
    assert verify_coreness(g, np.zeros(g.n, dtype=np.int64))


def test_verifier_rejects_inflation():
    """Sampling errors only inflate coreness; any inflation must fail."""
    g = gen.chung_lu(400, 10, seed=9)
    c = coreness(g)
    bad = c.copy()
    bad[np.argmax(c)] += 1
    assert not verify_coreness(g, bad)


def test_verifier_rejects_uniform_inflation():
    g = gen.grid_2d(8, 8)
    c = coreness(g) + 1
    assert not verify_coreness(g, c)


def test_verifier_rejects_negative():
    g = gen.grid_2d(4, 4)
    c = coreness(g)
    c[0] = -1
    assert not verify_coreness(g, c)
