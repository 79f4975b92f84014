"""Structural-property tests for every graph-family generator."""
import numpy as np
import pytest

from repro.graphs import generators as gen
from repro.seq.bz import coreness


# ------------------------------------------------------------- chung_lu
def test_chung_lu_deterministic():
    a = gen.chung_lu(500, 8, seed=3)
    b = gen.chung_lu(500, 8, seed=3)
    assert np.array_equal(a.indptr, b.indptr) and np.array_equal(a.adj, b.adj)


def test_chung_lu_seed_changes_graph():
    a = gen.chung_lu(500, 8, seed=3)
    b = gen.chung_lu(500, 8, seed=4)
    assert not (len(a.adj) == len(b.adj) and np.array_equal(a.adj, b.adj))


def test_chung_lu_avg_degree_close_to_target():
    g = gen.chung_lu(2000, 10, seed=1)
    avg = 2 * g.m / g.n
    assert 5 <= avg <= 10.5  # dedupe removes some mass


def test_chung_lu_power_law_has_hubs():
    g = gen.chung_lu(3000, 10, exponent=2.0, seed=2)
    d = g.degrees()
    assert d.max() > 20 * d.mean()


def test_chung_lu_heavier_tail_bigger_hub():
    d19 = gen.chung_lu(3000, 10, exponent=1.9, seed=2).degrees().max()
    d30 = gen.chung_lu(3000, 10, exponent=3.0, seed=2).degrees().max()
    assert d19 > d30


# --------------------------------------------------------- planted core
def test_planted_core_raises_kmax():
    base = gen.chung_lu(2000, 6, seed=5)
    boosted = gen.planted_core(base, 100, 60, seed=5)
    assert coreness(boosted).max() > coreness(base).max() + 5
    boosted.validate()


# ------------------------------------------------------------------ BA
def test_barabasi_albert_structure():
    g = gen.barabasi_albert(800, 5, seed=7)
    g.validate()
    # Attachment gives every non-seed vertex degree >= m0 (dedupe can
    # shave a little; allow a small deficit on few vertices).
    d = g.degrees()
    assert (d[6:] >= 3).all()
    assert d.max() > 30  # preferential attachment creates hubs


def test_barabasi_albert_coreness_bounded_by_m0():
    g = gen.barabasi_albert(500, 4, seed=8)
    assert coreness(g).max() <= 4


# ------------------------------------------------------------- lattices
def test_grid_2d_degrees_and_coreness():
    g = gen.grid_2d(15, 15)
    d = g.degrees()
    assert d.min() == 2 and d.max() == 4
    c = coreness(g)
    assert c.max() == 2 and (c == 2).all()  # whole grid is the 2-core


def test_grid_degraded_is_road_like():
    g = gen.grid_2d(30, 30, drop_prob=0.12, diag_prob=0.05, seed=1)
    g.validate()
    assert coreness(g).max() <= 4


def test_cube_3d_structure():
    g = gen.cube_3d(6)
    assert g.n == 216
    d = g.degrees()
    assert d.min() == 3 and d.max() == 6
    assert coreness(g).max() == 3


def test_honeycomb_structure():
    g = gen.honeycomb(12, 12)
    assert g.degrees().max() <= 3
    assert coreness(g).max() == 2


def test_honeycomb_holes_reduce_size():
    full = gen.honeycomb(20, 20)
    holed = gen.honeycomb(20, 20, hole_prob=0.1, seed=3)
    assert holed.m < full.m


# ----------------------------------------------------------------- hcns
@pytest.mark.parametrize("kmax", [10, 40, 80])
def test_hcns_exact_coreness_sequence(kmax):
    g = gen.hcns(kmax)
    c = coreness(g)
    assert c.max() == kmax
    # Exactly one vertex with coreness i for 1 <= i < kmax.
    hist = np.bincount(c)
    assert (hist[1:kmax] == 1).all()
    # The clique members all have coreness kmax.
    assert hist[kmax] == kmax + 1
    assert g.n == 2 * kmax


# ------------------------------------------------------------------ kNN
def _brute_knn(pts, k):
    n = len(pts)
    out = np.empty((n, k), dtype=np.int64)
    for i in range(n):
        d = ((pts - pts[i]) ** 2).sum(axis=1)
        d[i] = np.inf
        out[i] = np.argpartition(d, k - 1)[:k]
    return out


@pytest.mark.parametrize("dims,clusters", [(2, 0), (2, 5), (3, 0)])
def test_knn_graph_exact_vs_brute_force(dims, clusters):
    n, k = 300, 4
    g = gen.knn_graph(n, k, dims=dims, clusters=clusters, seed=11)
    pts = gen._knn_points(n, dims, clusters=clusters, seed=11)
    brute = _brute_knn(pts, k)
    # The symmetrized edge set must equal the symmetrized brute-force set
    # up to distance ties; compare distances instead of ids to be robust.
    src = np.repeat(np.arange(n), k)
    expect_edges = {(min(a, b), max(a, b)) for a, b in zip(src, brute.ravel())}
    got_edges = set()
    for v in range(g.n):
        for u in g.neighbors(v):
            got_edges.add((min(v, int(u)), max(v, int(u))))
    # Ties in kth distance can swap one neighbor; allow tiny slack.
    sym_diff = expect_edges ^ got_edges
    assert len(sym_diff) <= max(2, len(expect_edges) // 200), sym_diff


def test_knn_graph_min_degree_k():
    g = gen.knn_graph(500, 5, seed=12)
    assert g.degrees().min() >= 5  # symmetrization only adds edges


def test_knn_requires_enough_points():
    with pytest.raises(Exception):
        gen.knn_graph(3, 5, seed=1)


# ---------------------------------------------------------- TPC-H tie-in
def test_bipartite_from_lineitem():
    import pandas as pd

    li = pd.DataFrame(
        {"l_orderkey": [1, 1, 2, 3], "l_partkey": [1, 2, 2, 1]}
    )
    g = gen.bipartite_from_lineitem(li)
    g.validate()
    assert g.m == 4  # distinct (order, part) pairs
    assert g.n == 3 + 2
