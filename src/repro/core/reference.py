"""Brute-force O(n²) DBSCAN reference — the correctness oracle for clusters.

Implements the exact Ester et al. definition used by the paper (§2):

* p is a core point iff |{q : d(p,q) ≤ eps}| ≥ minPts (p itself counts);
* core points are partitioned by connectivity under distance ≤ eps;
* a non-core point belongs to *every* cluster owning a core point within
  eps (border points can be in several clusters); otherwise it is noise.

Output is canonical: each cluster is labelled by the minimum point id among
its core points, so results from any implementation can be compared as sets
of per-point ``frozenset`` labels, independent of internal label choices.
"""
from __future__ import annotations

import numpy as np

from repro.primitives.unionfind import UnionFind


def dbscan_brute(
    pts: np.ndarray, eps: float, min_pts: int
) -> tuple[np.ndarray, list[frozenset[int]]]:
    """Reference DBSCAN.

    Returns
    -------
    core : (n,) bool array — core-point flags.
    labels : list of per-point frozensets of canonical cluster ids
             (min core-point id of the cluster); empty frozenset = noise.
    """
    pts = np.asarray(pts, dtype=np.float64)
    n = len(pts)
    if n == 0:
        return np.zeros(0, dtype=bool), []
    eps2 = eps * eps
    # Pairwise distances in blocks to bound memory.
    core = np.zeros(n, dtype=bool)
    block = 2048
    counts = np.zeros(n, dtype=np.int64)
    for i in range(0, n, block):
        d2 = ((pts[i : i + block, None, :] - pts[None, :, :]) ** 2).sum(axis=2)
        counts[i : i + block] = (d2 <= eps2).sum(axis=1)
    core = counts >= min_pts
    core_idx = np.flatnonzero(core)
    # Union core points within eps.
    uf = UnionFind(len(core_idx))
    pos = {int(v): i for i, v in enumerate(core_idx)}
    cpts = pts[core_idx]
    for i in range(0, len(cpts), block):
        d2 = ((cpts[i : i + block, None, :] - cpts[None, :, :]) ** 2).sum(axis=2)
        ii, jj = np.nonzero(d2 <= eps2)
        for a, b in zip(ii + i, jj):
            if a != b:
                uf.union(int(a), int(b))
    # Canonical label: min original id in each component.
    comp_min: dict[int, int] = {}
    for i, v in enumerate(core_idx):
        r = uf.find(i)
        if r not in comp_min or int(v) < comp_min[r]:
            comp_min[r] = int(v)
    labels: list[frozenset[int]] = [frozenset()] * n
    out = [set() for _ in range(n)]
    for i, v in enumerate(core_idx):
        out[int(v)].add(comp_min[uf.find(i)])
    # Border points: any cluster with a core point within eps.
    noncore_idx = np.flatnonzero(~core)
    if len(core_idx) and len(noncore_idx):
        for i in range(0, len(noncore_idx), block):
            seg = noncore_idx[i : i + block]
            d2 = ((pts[seg, None, :] - cpts[None, :, :]) ** 2).sum(axis=2)
            ii, jj = np.nonzero(d2 <= eps2)
            for a, b in zip(ii, jj):
                out[int(seg[a])].add(comp_min[uf.find(int(b))])
    labels = [frozenset(s) for s in out]
    return core, labels
