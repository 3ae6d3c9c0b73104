"""Unit tests for Bowyer–Watson Delaunay (repro.spatial.delaunay)."""
import numpy as np
import pytest

from repro.spatial.delaunay import delaunay_edges


def _in_circumcircle(a, b, c, p):
    """Standard incircle determinant (positive = p strictly inside)."""
    m = np.array(
        [
            [a[0] - p[0], a[1] - p[1], (a[0] - p[0]) ** 2 + (a[1] - p[1]) ** 2],
            [b[0] - p[0], b[1] - p[1], (b[0] - p[0]) ** 2 + (b[1] - p[1]) ** 2],
            [c[0] - p[0], c[1] - p[1], (c[0] - p[0]) ** 2 + (c[1] - p[1]) ** 2],
        ]
    )
    det = np.linalg.det(m)
    # Sign convention depends on orientation of abc.
    orient = (b[0] - a[0]) * (c[1] - a[1]) - (b[1] - a[1]) * (c[0] - a[0])
    return det * np.sign(orient)


def test_trivial_sizes():
    assert delaunay_edges(np.empty((0, 2))).shape == (0, 2)
    assert delaunay_edges(np.array([[0.0, 0.0]])).shape == (0, 2)
    e = delaunay_edges(np.array([[0.0, 0.0], [1.0, 1.0]]))
    assert e.tolist() == [[0, 1]]


def test_triangle():
    e = delaunay_edges(np.array([[0.0, 0.0], [1.0, 0.0], [0.0, 1.0]]))
    assert set(map(tuple, e.tolist())) == {(0, 1), (0, 2), (1, 2)}


def test_square_has_diagonal():
    """4 corners of a square: 4 sides + exactly one diagonal."""
    e = delaunay_edges(np.array([[0.0, 0.0], [1.0, 0.0], [1.0, 1.0], [0.0, 1.01]]))
    assert len(e) == 5


def test_edge_count_bound():
    """A triangulation of n points has at most 3n - 6 edges (n >= 3)."""
    rng = np.random.default_rng(0)
    pts = rng.random((200, 2)) * 100
    e = delaunay_edges(pts)
    assert len(e) <= 3 * 200 - 6
    # Connected: union-find over edges touches every vertex
    from repro.primitives.unionfind import UnionFind

    uf = UnionFind(200)
    for a, b in e:
        uf.union(int(a), int(b))
    assert uf.n_components == 1


def test_nearest_neighbor_edges_present():
    """The DT contains each point's nearest-neighbor edge (NN-graph ⊆ DT)."""
    rng = np.random.default_rng(7)
    pts = rng.random((120, 2)) * 10
    e = {tuple(x) for x in delaunay_edges(pts).tolist()}
    d2 = ((pts[:, None, :] - pts[None, :, :]) ** 2).sum(axis=2)
    np.fill_diagonal(d2, np.inf)
    for i in range(len(pts)):
        j = int(np.argmin(d2[i]))
        assert (min(i, j), max(i, j)) in e


@pytest.mark.parametrize("seed", [1, 2, 3])
def test_empty_circumcircle_property(seed):
    """For every DT triangle-ish check: sample triangles from edges via a
    direct (slow) validation on small n — no point strictly inside the
    circumcircle of any reconstructed Delaunay triangle."""
    rng = np.random.default_rng(seed)
    n = 40
    pts = rng.random((n, 2)) * 100
    edges = delaunay_edges(pts)
    adj = {i: set() for i in range(n)}
    for a, b in edges:
        adj[int(a)].add(int(b))
        adj[int(b)].add(int(a))
    # Reconstruct triangles as mutually-adjacent triples
    tris = set()
    for a in range(n):
        for b in adj[a]:
            if b <= a:
                continue
            for c in adj[a] & adj[b]:
                if c <= b:
                    continue
                tris.add((a, b, c))
    checked = 0
    for (a, b, c) in tris:
        inside = 0
        for p in range(n):
            if p in (a, b, c):
                continue
            if _in_circumcircle(pts[a], pts[b], pts[c], pts[p]) > 1e-6:
                inside += 1
        # Mutually-adjacent triples are a superset of DT triangles (they can
        # also be "holes" spanned by three DT edges); require that genuine
        # small triangles are empty.
        if inside == 0:
            checked += 1
    assert checked >= len(tris) * 0.5  # most triples are genuine DT faces


def test_collinear_fallback():
    pts = np.stack([np.arange(10.0), np.zeros(10)], axis=1)
    e = delaunay_edges(pts)
    # Path over the 10 collinear points
    assert len(e) >= 9
    from repro.primitives.unionfind import UnionFind

    uf = UnionFind(10)
    for a, b in e:
        uf.union(int(a), int(b))
    assert uf.n_components == 1


def test_deterministic_given_seed():
    rng = np.random.default_rng(11)
    pts = rng.random((60, 2))
    e1 = delaunay_edges(pts, seed=5)
    e2 = delaunay_edges(pts, seed=5)
    assert np.array_equal(e1, e2)
