"""From-scratch 2D Delaunay triangulation (Bowyer–Watson), numpy-accelerated.

The paper's 2D Delaunay-based cell graph (§4.4) uses PBBS's parallel
randomized-incremental DT over all *core points*; edges between different
cells with length ≤ eps connect the cells.  Core points are far fewer than n
and the DT is built once, so this reproduction builds it on the driver
(substitution documented in DESIGN.md); the subsequent edge filter runs as a
Spark/numpy data-parallel filter.

Implementation: classic Bowyer–Watson, inserting points in random order.  The
"find all triangles whose circumcircle contains p" step — the hot loop — is a
single vectorised numpy pass over flat circumcenter/radius arrays, which makes
the simple O(n) -per-insertion variant fast enough (~seconds for tens of
thousands of points) without the fragile adjacency-walking machinery.  Dead
triangles are compacted periodically.
"""
from __future__ import annotations

import numpy as np


def _circumcircle(a: np.ndarray, b: np.ndarray, c: np.ndarray) -> tuple[float, float, float]:
    """Circumcenter (x, y) and squared radius of triangle abc.

    Near-collinear triangles get a huge circle, which in Bowyer–Watson simply
    retriangulates them away.
    """
    ax, ay = a
    bx, by = b
    cx, cy = c
    d = 2.0 * (ax * (by - cy) + bx * (cy - ay) + cx * (ay - by))
    if abs(d) < 1e-12:
        return 1e30, 1e30, 1e60
    a2 = ax * ax + ay * ay
    b2 = bx * bx + by * by
    c2 = cx * cx + cy * cy
    ux = (a2 * (by - cy) + b2 * (cy - ay) + c2 * (ay - by)) / d
    uy = (a2 * (cx - bx) + b2 * (ax - cx) + c2 * (bx - ax)) / d
    r2 = (ux - ax) ** 2 + (uy - ay) ** 2
    return ux, uy, r2


def delaunay_edges(pts: np.ndarray, seed: int = 0) -> np.ndarray:
    """Delaunay triangulation edges of distinct 2D points.

    Parameters
    ----------
    pts : (n, 2) float array of *distinct* points (dedupe before calling).

    Returns
    -------
    (m, 2) int array of index pairs (i < j), each an edge of the DT.
    Degenerate inputs (n < 2) return an empty array; n == 2 returns the
    single edge; fully-collinear inputs return the path edges.
    """
    pts = np.asarray(pts, dtype=np.float64)
    n = len(pts)
    if n < 2:
        return np.empty((0, 2), dtype=np.int64)
    if n == 2:
        return np.array([[0, 1]], dtype=np.int64)

    lo = pts.min(axis=0)
    hi = pts.max(axis=0)
    span = float(max(hi[0] - lo[0], hi[1] - lo[1], 1e-9))
    mid = (lo + hi) / 2.0
    # Super-triangle far outside the data so its circumcircles do not clip
    # real Delaunay edges near the hull.
    m = 100.0 * span
    sup = np.array(
        [[mid[0] - 2 * m, mid[1] - m], [mid[0] + 2 * m, mid[1] - m], [mid[0], mid[1] + 2 * m]]
    )
    allp = np.vstack([pts, sup])
    s0, s1, s2 = n, n + 1, n + 2

    cap = 16 * n + 16
    tri = np.empty((cap, 3), dtype=np.int64)
    ccx = np.empty(cap, dtype=np.float64)
    ccy = np.empty(cap, dtype=np.float64)
    cr2 = np.empty(cap, dtype=np.float64)
    alive = np.zeros(cap, dtype=bool)

    def add_tri(m_: int, a: int, b: int, c: int) -> int:
        nonlocal cap, tri, ccx, ccy, cr2, alive
        if m_ >= cap:
            cap *= 2
            tri = np.resize(tri, (cap, 3))
            ccx = np.resize(ccx, cap)
            ccy = np.resize(ccy, cap)
            cr2 = np.resize(cr2, cap)
            alive = np.resize(alive, cap)
        tri[m_] = (a, b, c)
        x, y, r2 = _circumcircle(allp[a], allp[b], allp[c])
        ccx[m_], ccy[m_], cr2[m_] = x, y, r2
        alive[m_] = True
        return m_ + 1

    m_tri = add_tri(0, s0, s1, s2)

    rng = np.random.default_rng(seed)
    order = rng.permutation(n)
    for p in order:
        px, py = allp[p]
        # Vectorised bad-triangle scan: circumcircle strictly contains p.
        live = alive[:m_tri]
        d2 = (ccx[:m_tri] - px) ** 2 + (ccy[:m_tri] - py) ** 2
        bad = np.flatnonzero(live & (d2 < cr2[:m_tri] * (1.0 - 1e-12)))
        if bad.size == 0:
            # Numerically on a circle boundary everywhere — nudge by scanning
            # with inclusive comparison.
            bad = np.flatnonzero(live & (d2 <= cr2[:m_tri]))
        # Cavity boundary: edges appearing exactly once among bad triangles.
        edge_count: dict[tuple[int, int], int] = {}
        for t in bad:
            a, b, c = tri[t]
            for u, v in ((a, b), (b, c), (c, a)):
                k = (u, v) if u < v else (v, u)
                edge_count[k] = edge_count.get(k, 0) + 1
        alive[bad] = False
        for (u, v), cnt in edge_count.items():
            if cnt == 1:
                m_tri = add_tri(m_tri, u, v, p)
        # Compact when mostly dead to keep scans linear in live triangles.
        if m_tri > 256 and alive[:m_tri].sum() * 2 < m_tri:
            keep = np.flatnonzero(alive[:m_tri])
            k = len(keep)
            tri[:k] = tri[keep]
            ccx[:k] = ccx[keep]
            ccy[:k] = ccy[keep]
            cr2[:k] = cr2[keep]
            alive[:k] = True
            alive[k:m_tri] = False
            m_tri = k

    live_tris = tri[np.flatnonzero(alive[:m_tri])]
    # Drop triangles touching the super-triangle, emit unique edges.
    mask = (live_tris < n).all(axis=1)
    real = live_tris[mask]
    if real.size == 0:
        # All points collinear: fall back to the sorted path, which contains
        # every nearest-neighbour adjacency DBSCAN needs.
        key = np.lexsort((pts[:, 1], pts[:, 0]))
        path = np.stack([key[:-1], key[1:]], axis=1).astype(np.int64)
        path.sort(axis=1)
        return path
    e = np.vstack([real[:, [0, 1]], real[:, [1, 2]], real[:, [2, 0]]])
    e.sort(axis=1)
    return np.unique(e, axis=0)
