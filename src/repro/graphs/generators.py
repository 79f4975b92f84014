"""Deterministic synthetic generators for the paper's 25 graph families.

The paper evaluates on real graphs up to 226B edges (social, web, road,
k-NN, meshes, lattices, and adversarial synthetics). We reproduce each
*family* at laptop scale with generators that preserve the structural
property the paper's evaluation exercises:

- ``chung_lu``       power-law social/web graphs (hub contention)
- ``planted_core``   dense ER core overlay (drives k_max up: web graphs)
- ``grid_2d``        GRID lattice and (degraded) road networks (high rho)
- ``cube_3d``        CUBE lattice
- ``honeycomb``      degree-3 meshes, TRCE/BBL analogues (high rho)
- ``knn_graph``      exact k-NN on 2D/3D points via cell buckets
- ``hcns``           one vertex per coreness value + clique (k_max stress)
- ``barabasi_albert``HPL power-law graph

All generators take an integer ``seed`` and are deterministic in it.
"""
from __future__ import annotations

import numpy as np

from repro.graphs.csr import CSR, build_csr


def _rng(seed: int) -> np.random.Generator:
    return np.random.default_rng(seed)


def _edges_to_csr(n: int, src: np.ndarray, dst: np.ndarray) -> CSR:
    return build_csr(n, src, dst)


# ---------------------------------------------------------------------------
# Power-law families


def chung_lu(
    n: int,
    avg_deg: float,
    exponent: float = 2.3,
    *,
    seed: int = 0,
    max_weight_frac: float = 0.05,
) -> CSR:
    """Chung–Lu power-law graph with ~n*avg_deg/2 undirected edges.

    Expected degree of rank-i vertex is proportional to
    ``(i + i0)^(-1/(exponent-1))``; endpoints of each edge are sampled
    independently proportional to the weights (duplicate edges and
    self-loops are dropped, so realized average degree is slightly
    below ``avg_deg``). ``max_weight_frac`` caps any single vertex's
    share of the weight mass so hubs are heavy but not degenerate.
    """
    rng = _rng(seed)
    gamma = 1.0 / (exponent - 1.0)
    i0 = 2.0
    w = (np.arange(n, dtype=np.float64) + i0) ** (-gamma)
    w = np.minimum(w, w.sum() * max_weight_frac)
    cdf = np.cumsum(w)
    cdf /= cdf[-1]
    m = int(n * avg_deg / 2)
    src = np.searchsorted(cdf, rng.random(m))
    dst = np.searchsorted(cdf, rng.random(m))
    # Shuffle vertex ids so hubs are not contiguous low ids.
    perm = rng.permutation(n)
    return _edges_to_csr(n, perm[src], perm[dst])


def planted_core(
    base: CSR, core_size: int, core_avg_deg: float, *, seed: int = 0
) -> CSR:
    """Overlay a dense ER subgraph on ``core_size`` random vertices.

    Raises the graph's k_max to roughly ``core_avg_deg/2`` (the ER
    core's degeneracy), reproducing the very dense cores of web graphs
    (EH/SD/CW/HL*) and HPL relative to plain power-law graphs.
    """
    rng = _rng(seed)
    n = base.n
    members = rng.choice(n, size=core_size, replace=False)
    m_extra = int(core_size * core_avg_deg / 2)
    src = members[rng.integers(0, core_size, m_extra)]
    dst = members[rng.integers(0, core_size, m_extra)]
    from repro.graphs.csr import edge_array

    old = edge_array(base)
    return _edges_to_csr(
        n, np.concatenate([old[:, 0], src]), np.concatenate([old[:, 1], dst])
    )


def barabasi_albert(n: int, m0: int, *, seed: int = 0) -> CSR:
    """Barabási–Albert preferential attachment (HPL family).

    Each new vertex attaches ``m0`` edges to targets drawn uniformly
    from the endpoint list of existing edges (the standard linear
    preferential-attachment trick).
    """
    rng = _rng(seed)
    assert n > m0 >= 1
    # Endpoint pool: every inserted edge contributes both endpoints.
    pool = np.empty(2 * n * m0, dtype=np.int64)
    src = np.empty(n * m0, dtype=np.int64)
    dst = np.empty(n * m0, dtype=np.int64)
    # Seed star on vertices 0..m0.
    pool_len = 0
    e = 0
    for v in range(1, m0 + 1):
        src[e], dst[e] = v, 0
        pool[pool_len : pool_len + 2] = (v, 0)
        pool_len += 2
        e += 1
    for v in range(m0 + 1, n):
        targets = pool[rng.integers(0, pool_len, m0)]
        src[e : e + m0] = v
        dst[e : e + m0] = targets
        pool[pool_len : pool_len + m0] = targets
        pool[pool_len + m0 : pool_len + 2 * m0] = v
        pool_len += 2 * m0
        e += m0
    return _edges_to_csr(n, src[:e], dst[:e])


# ---------------------------------------------------------------------------
# Lattice families


def grid_2d(
    rows: int,
    cols: int,
    *,
    drop_prob: float = 0.0,
    diag_prob: float = 0.0,
    seed: int = 0,
) -> CSR:
    """2D 4-neighbor lattice; optionally degrade into a road network.

    ``drop_prob`` removes a fraction of lattice edges and ``diag_prob``
    adds that fraction of diagonal shortcuts — with both nonzero the
    result resembles OSM road networks (k_max 3–4, long cascades).
    """
    rng = _rng(seed)
    n = rows * cols
    vid = np.arange(n, dtype=np.int64).reshape(rows, cols)
    right = np.column_stack([vid[:, :-1].ravel(), vid[:, 1:].ravel()])
    down = np.column_stack([vid[:-1, :].ravel(), vid[1:, :].ravel()])
    edges = np.concatenate([right, down])
    if drop_prob > 0:
        edges = edges[rng.random(len(edges)) >= drop_prob]
    if diag_prob > 0:
        diag = np.column_stack([vid[:-1, :-1].ravel(), vid[1:, 1:].ravel()])
        diag = diag[rng.random(len(diag)) < diag_prob]
        edges = np.concatenate([edges, diag])
    return _edges_to_csr(n, edges[:, 0], edges[:, 1])


def cube_3d(side: int) -> CSR:
    """3D 6-neighbor lattice (the CUBE graph, k_max = 3)."""
    n = side**3
    vid = np.arange(n, dtype=np.int64).reshape(side, side, side)
    ex = np.column_stack([vid[:-1, :, :].ravel(), vid[1:, :, :].ravel()])
    ey = np.column_stack([vid[:, :-1, :].ravel(), vid[:, 1:, :].ravel()])
    ez = np.column_stack([vid[:, :, :-1].ravel(), vid[:, :, 1:].ravel()])
    edges = np.concatenate([ex, ey, ez])
    return _edges_to_csr(n, edges[:, 0], edges[:, 1])


def honeycomb(
    rows: int, cols: int, *, hole_prob: float = 0.0, seed: int = 0
) -> CSR:
    """Brick-wall (hexagonal) lattice: interior degree 3, k_max = 2.

    TRCE/BBL analogue: sparse mesh with very long peeling cascades.
    ``hole_prob`` deletes random vertices to emulate the holes in the
    simulation meshes.
    """
    rng = _rng(seed)
    n = rows * cols
    vid = np.arange(n, dtype=np.int64).reshape(rows, cols)
    right = np.column_stack([vid[:, :-1].ravel(), vid[:, 1:].ravel()])
    # Vertical edges only where (row+col) is even -> brick wall.
    r, c = np.meshgrid(np.arange(rows - 1), np.arange(cols), indexing="ij")
    keep = ((r + c) % 2) == 0
    down = np.column_stack([vid[:-1, :][keep], vid[1:, :][keep]])
    edges = np.concatenate([right, down])
    if hole_prob > 0:
        alive = rng.random(n) >= hole_prob
        edges = edges[alive[edges[:, 0]] & alive[edges[:, 1]]]
    return _edges_to_csr(n, edges[:, 0], edges[:, 1])


# ---------------------------------------------------------------------------
# k-NN family


def _knn_points(
    n: int, dims: int, *, clusters: int = 0, seed: int = 0
) -> np.ndarray:
    """Random points in [0,1]^dims; optionally a Gaussian-mixture
    (clustered, like GPS traces) instead of uniform."""
    rng = _rng(seed)
    if clusters <= 0:
        return rng.random((n, dims))
    centers = rng.random((clusters, dims))
    which = rng.integers(0, clusters, n)
    pts = centers[which] + rng.normal(0, 0.02, (n, dims))
    return np.clip(pts, 0.0, 1.0)


def knn_graph(
    n: int,
    k: int,
    *,
    dims: int = 2,
    clusters: int = 0,
    seed: int = 0,
) -> CSR:
    """Exact k-nearest-neighbor graph on random points, symmetrized.

    Uses a uniform cell grid as the spatial index. Points are processed
    cell-by-cell (all points in a cell share a candidate box), with a
    per-point ring expansion fallback whenever the k-th best distance is
    not provably covered by the scanned box. This is the substrate the
    paper's k-NN datasets (CH5/GL*/COS5) need.
    """
    pts = _knn_points(n, dims, clusters=clusters, seed=seed)
    cells_per_axis = max(1, int((n / max(2 * k, 8)) ** (1.0 / dims)))
    cw = 1.0 / cells_per_axis
    cell = np.clip((pts / cw).astype(np.int64), 0, cells_per_axis - 1)
    flat = cell[:, 0].copy()
    for d in range(1, dims):
        flat = flat * cells_per_axis + cell[:, d]
    order = np.argsort(flat, kind="stable")
    sorted_flat = flat[order]
    n_cells = cells_per_axis**dims
    cell_start = np.searchsorted(sorted_flat, np.arange(n_cells))
    cell_end = np.searchsorted(sorted_flat, np.arange(n_cells), side="right")

    def box_members(lo: np.ndarray, hi: np.ndarray) -> np.ndarray:
        ranges = [np.arange(lo[d], hi[d] + 1) for d in range(dims)]
        grid = np.array(np.meshgrid(*ranges, indexing="ij")).reshape(dims, -1)
        f = grid[0].copy()
        for d in range(1, dims):
            f = f * cells_per_axis + grid[d]
        return np.concatenate(
            [order[cell_start[c] : cell_end[c]] for c in f]
        )

    def margin(p: np.ndarray, lo: np.ndarray, hi: np.ndarray) -> float:
        """Provable cover radius: distance from p to the nearest
        non-domain boundary of the scanned box (inf where clamped)."""
        m = np.inf
        for d in range(dims):
            if lo[d] > 0:
                m = min(m, p[d] - lo[d] * cw)
            if hi[d] < cells_per_axis - 1:
                m = min(m, (hi[d] + 1) * cw - p[d])
        return m

    def knn_of(point_ids: np.ndarray, cand: np.ndarray) -> tuple[np.ndarray, np.ndarray]:
        """For each point id, its k nearest among cand (excluding self).
        Returns (neighbor ids (len(point_ids), k), kth distances)."""
        d2 = ((pts[cand][None, :, :] - pts[point_ids][:, None, :]) ** 2).sum(axis=2)
        d2[cand[None, :] == point_ids[:, None]] = np.inf
        idx = np.argpartition(d2, k - 1, axis=1)[:, :k]
        rows = np.arange(len(point_ids))[:, None]
        kth = np.sqrt(d2[rows, idx].max(axis=1))
        return cand[idx], kth

    dst = np.empty((n, k), dtype=np.int64)
    occupied = np.unique(flat)
    redo: list[int] = []
    for f in occupied:
        members = order[cell_start[f] : cell_end[f]]
        coord = np.empty(dims, dtype=np.int64)
        rem = int(f)
        for d in range(dims - 1, -1, -1):
            coord[d] = rem % cells_per_axis
            rem //= cells_per_axis
        lo = np.maximum(coord - 1, 0)
        hi = np.minimum(coord + 1, cells_per_axis - 1)
        cand = box_members(lo, hi)
        if len(cand) <= k:
            redo.extend(int(i) for i in members)
            continue
        nbrs, kth = knn_of(members, cand)
        dst[members] = nbrs
        for j, i in enumerate(members):
            if kth[j] > margin(pts[i], lo, hi):
                redo.append(int(i))
    for i in redo:
        ring = 2
        while True:
            lo = np.maximum(cell[i] - ring, 0)
            hi = np.minimum(cell[i] + ring, cells_per_axis - 1)
            cand = box_members(lo, hi)
            full = (lo == 0).all() and (hi == cells_per_axis - 1).all()
            if len(cand) > k:
                nbrs, kth = knn_of(np.array([i]), cand)
                if full or kth[0] <= margin(pts[i], lo, hi):
                    dst[i] = nbrs[0]
                    break
            elif full:
                raise ValueError("n must exceed k+1 for a k-NN graph")
            ring += 1
    src = np.repeat(np.arange(n, dtype=np.int64), k)
    return _edges_to_csr(n, src, dst.ravel())


# ---------------------------------------------------------------------------
# Adversarial synthetics


def hcns(k_max: int) -> CSR:
    """High-coreness synthetic (HCNS, Sec. 6.1.1).

    A (k_max+1)-clique (coreness k_max) plus chain vertices u_1..u_{k_max-1}
    where u_i has exactly i edges into the clique, so u_i has coreness
    exactly i and is the only vertex peeled in round i. This yields
    rho = k_max and n = 2*k_max, stressing the bucketing structure.
    """
    clique = np.arange(k_max + 1, dtype=np.int64)
    cs, cd = np.meshgrid(clique, clique)
    mask = cs < cd
    src = [cs[mask]]
    dst = [cd[mask]]
    n = k_max + 1 + (k_max - 1)
    for i in range(1, k_max):
        u = k_max + i  # chain vertex with target coreness i
        # Round-robin attachment keeps clique degrees balanced.
        targets = (np.arange(i) * 7 + i) % (k_max + 1)
        targets = np.unique(targets)
        # Ensure exactly i distinct targets.
        extra = 0
        while len(targets) < i:
            cand = (targets[-1] + 1 + extra) % (k_max + 1)
            if cand not in targets:
                targets = np.append(targets, cand)
            extra += 1
        src.append(np.full(i, u, dtype=np.int64))
        dst.append(targets[:i].astype(np.int64))
    return _edges_to_csr(n, np.concatenate(src), np.concatenate(dst))


def bipartite_from_lineitem(li_pdf) -> CSR:
    """Order–part bipartite graph from TPC-H-lite lineitem (pandas).

    Ties the graph layer to the provided relational generators: order
    keys map to ids [0, n_orders), part keys to [n_orders, ...).
    """
    ok = li_pdf["l_orderkey"].to_numpy(dtype=np.int64)
    pk = li_pdf["l_partkey"].to_numpy(dtype=np.int64)
    n_orders = int(ok.max())
    n = n_orders + int(pk.max())
    return build_csr(n, ok - 1, n_orders + pk - 1)
