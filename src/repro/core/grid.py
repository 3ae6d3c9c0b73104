"""Grid cell construction (§4.1) and neighbor-cell finding (§5.1).

Points are placed in disjoint d-dimensional cells of side eps/√d, so that any
two points in the same cell are within eps of each other.  The paper
semisorts (cell-id, point-id) pairs and stores non-empty cells in a parallel
hash table; here the cell id is computed with pure Catalyst expressions
(``floor(x_j / side)``) and the semisort is Spark's shuffle ``groupBy``
(see ``repro.primitives.semisort``).  The non-empty-cell table — O(#cells),
orders of magnitude smaller than the input — is collected to the driver,
which plays the role of the paper's cell hash table.

Neighbor cells (cells that can contain a point within eps of a point in the
current cell) are found either by enumerating integer offsets (feasible for
d ≤ 3, §4.1) or by range queries on a k-d tree over the non-empty cells
(the paper's §5.1 approach for higher d; ours is built driver-side —
substitution documented in DESIGN.md).
"""
from __future__ import annotations

import itertools
import math

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.spatial.kdtree import KDTree


def cell_side(eps: float, d: int) -> float:
    """Grid cell side length eps/√d (cell diagonal = eps)."""
    return eps / math.sqrt(d)


def xcols(d: int) -> list[str]:
    return [f"x{j}" for j in range(d)]


def ccols(d: int) -> list[str]:
    return [f"c{j}" for j in range(d)]


def with_cells(points: DataFrame, eps: float, d: int) -> DataFrame:
    """Add integer cell coordinates c0..c{d-1} and a string ``cell`` key."""
    side = cell_side(eps, d)
    out = points
    for j in range(d):
        out = out.withColumn(f"c{j}", F.floor(F.col(f"x{j}") / F.lit(side)).cast("long"))
    return out.withColumn("cell", F.concat_ws(",", *[F.col(c).cast("string") for c in ccols(d)]))


def cell_table(pts_cells: DataFrame, d: int) -> pd.DataFrame:
    """Driver-side non-empty cell table: cell key, coords, count.

    This is the reproduction's stand-in for the paper's parallel hash table
    of non-empty cells; it is O(#cells) and drives neighbor finding and the
    cell graph.
    """
    agg = (
        pts_cells.groupBy("cell", *ccols(d))
        .agg(F.count("*").alias("cnt"))
        .toPandas()
        .sort_values("cell", kind="stable")
        .reset_index(drop=True)
    )
    return agg


def neighbor_offsets(d: int) -> np.ndarray:
    """Integer offsets o ≠ 0 such that cells at offset o can contain points
    within eps: Σ_j max(|o_j|-1, 0)² ≤ d  (cell side = eps/√d)."""
    r = int(math.isqrt(d)) + 1
    offs = []
    for o in itertools.product(range(-r, r + 1), repeat=d):
        if all(v == 0 for v in o):
            continue
        s = sum(max(abs(v) - 1, 0) ** 2 for v in o)
        if s <= d:
            offs.append(o)
    return np.array(offs, dtype=np.int64)


def neighbor_pairs_enum(cells: pd.DataFrame, d: int) -> pd.DataFrame:
    """Neighbor pairs by offset enumeration (d ≤ 3): pandas merge per offset.

    Returns a directed pair table (cell, ncell) excluding self-pairs; both
    directions are present.
    """
    cc = ccols(d)
    base = cells[["cell"] + cc]
    out = []
    for off in neighbor_offsets(d):
        shifted = base.copy()
        for j in range(d):
            shifted[cc[j]] = shifted[cc[j]] + off[j]
        m = shifted.merge(
            base.rename(columns={"cell": "ncell"}), on=cc, how="inner"
        )[["cell", "ncell"]]
        if len(m):
            out.append(m)
    if not out:
        return pd.DataFrame({"cell": pd.Series(dtype=object), "ncell": pd.Series(dtype=object)})
    return pd.concat(out, ignore_index=True)


def neighbor_pairs_kdtree(cells: pd.DataFrame, d: int) -> pd.DataFrame:
    """Neighbor pairs via radius queries on a k-d tree over cell coords.

    Two cells are neighbors iff the min distance between their boxes is
    ≤ eps, i.e. Σ_j (max(|Δc_j|-1,0))² ≤ d in cell units.  We query a
    superset (center distance ≤ √d + √d = 2√d in cell units... precisely
    |Δc| ≤ gap + 1 per dim ⇒ ||Δc|| ≤ √(Σ(gap_j+1)²) ≤ √(Σgap_j²) + √d
    ≤ 2√d) and filter exactly.
    """
    cc = ccols(d)
    coords = cells[cc].to_numpy(dtype=np.float64)
    tree = KDTree(coords)
    radius = 2.0 * math.sqrt(d) + 1e-9
    src, dst = [], []
    for i in range(len(coords)):
        cand = tree.query_radius(coords[i], radius)
        dc = np.abs(coords[cand] - coords[i])
        gap2 = (np.maximum(dc - 1.0, 0.0) ** 2).sum(axis=1)
        ok = cand[(gap2 <= d + 1e-9)]
        for j in ok:
            if j != i:
                src.append(i)
                dst.append(j)
    keys = cells["cell"].to_numpy()
    return pd.DataFrame({"cell": keys[src], "ncell": keys[dst]})


def neighbor_pairs(cells: pd.DataFrame, d: int) -> pd.DataFrame:
    """Dispatch: offset enumeration for d ≤ 3, k-d tree otherwise."""
    if d <= 3:
        return neighbor_pairs_enum(cells, d)
    return neighbor_pairs_kdtree(cells, d)


def cell_boxes(cells: pd.DataFrame, eps: float, d: int) -> pd.DataFrame:
    """Per-cell square box (lo0..lo{d-1}, side) for quadtree roots."""
    side = cell_side(eps, d)
    out = cells[["cell"]].copy()
    for j in range(d):
        out[f"lo{j}"] = cells[f"c{j}"].to_numpy(dtype=np.float64) * side
    out["side"] = side
    return out
