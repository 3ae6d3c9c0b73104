"""Tests for grid cell construction and neighbor finding (repro.core.grid)."""
import math

import numpy as np
import pandas as pd
import pytest

from repro import synth_data as sd
from repro.core import grid
from repro.oracle import assert_equivalent


@pytest.mark.parametrize("d", [1, 2, 3, 5, 7])
def test_cell_side(d):
    eps = 2.5
    s = grid.cell_side(eps, d)
    # cell diagonal equals eps
    assert math.sqrt(d) * s == pytest.approx(eps)


def test_with_cells_matches_numpy(spark):
    pts = np.array([[0.1, 0.2], [1.9, -0.3], [-2.5, 4.0]])
    df = grid.with_cells(sd.points_df(spark, pts), eps=1.0, d=2)
    side = grid.cell_side(1.0, 2)
    got = df.toPandas().sort_values("id")
    want = np.floor(pts / side).astype(np.int64)
    assert np.array_equal(got[["c0", "c1"]].to_numpy(), want)
    # key encodes the coords
    assert got["cell"].tolist() == [f"{a},{b}" for a, b in want]


def test_with_cells_negative_coords(spark):
    """floor (not truncation) must be used for negative coordinates."""
    pts = np.array([[-0.1, -0.1]])
    df = grid.with_cells(sd.points_df(spark, pts), eps=math.sqrt(2), d=2)
    row = df.collect()[0]
    assert (row["c0"], row["c1"]) == (-1, -1)


def test_same_cell_points_within_eps(spark):
    """Invariant: any two points in the same cell are within eps."""
    rng = np.random.default_rng(0)
    pts = rng.random((2000, 3)) * 10
    eps = 1.3
    df = grid.with_cells(sd.points_df(spark, pts), eps, 3)
    pdf = df.toPandas()
    for _, g in pdf.groupby("cell"):
        if len(g) < 2:
            continue
        arr = g[["x0", "x1", "x2"]].to_numpy()
        d2 = ((arr[:, None, :] - arr[None, :, :]) ** 2).sum(axis=2)
        assert d2.max() <= eps * eps + 1e-9


def test_cell_table_counts_oracle(spark):
    pts = sd.seed_spreader(500, 2, seed=5)
    eps = 200.0
    df = grid.with_cells(sd.points_df(spark, pts), eps, 2).cache()
    cells = grid.cell_table(df, 2)
    assert cells["cnt"].sum() == 500
    # DuckDB cross-check of the per-cell histogram
    side = grid.cell_side(eps, 2)
    from pyspark.sql import functions as F

    spark_counts = df.groupBy("c0", "c1").agg(F.count("*").alias("cnt"))
    pdf = pd.DataFrame({"x0": pts[:, 0], "x1": pts[:, 1]})
    assert_equivalent(
        spark_counts,
        f"SELECT CAST(FLOOR(x0/{side}) AS BIGINT) AS c0,"
        f" CAST(FLOOR(x1/{side}) AS BIGINT) AS c1, COUNT(*) AS cnt FROM p GROUP BY 1, 2",
        p=pdf,
    )


@pytest.mark.parametrize("d,expected_r", [(2, 2), (3, 2), (4, 3), (7, 3)])
def test_neighbor_offsets_radius(d, expected_r):
    offs = grid.neighbor_offsets(d)
    assert np.abs(offs).max() == expected_r
    # 0 not included, symmetric
    assert not (offs == 0).all(axis=1).any()
    offset_set = set(map(tuple, offs.tolist()))
    assert all(tuple(-o for o in t) in offset_set for t in offset_set)


def test_neighbor_offsets_correctness_2d():
    """Offsets must include exactly the cells whose min box distance ≤ eps."""
    d = 2
    offs = set(map(tuple, grid.neighbor_offsets(d).tolist()))
    side = grid.cell_side(1.0, d)  # eps=1
    for ox in range(-4, 5):
        for oy in range(-4, 5):
            if (ox, oy) == (0, 0):
                continue
            gap2 = (max(abs(ox) - 1, 0) ** 2 + max(abs(oy) - 1, 0) ** 2) * side * side
            if gap2 <= 1.0 + 1e-12:
                assert (ox, oy) in offs, (ox, oy)
            else:
                assert (ox, oy) not in offs, (ox, oy)


def _cells_pdf(pts, eps, d):
    side = grid.cell_side(eps, d)
    cc = np.floor(pts / side).astype(np.int64)
    uniq, counts = np.unique(cc, axis=0, return_counts=True)
    data = {"cell": [",".join(map(str, row)) for row in uniq]}
    for j in range(d):
        data[f"c{j}"] = uniq[:, j]
    data["cnt"] = counts
    return pd.DataFrame(data)


@pytest.mark.parametrize("d", [2, 3])
def test_enum_equals_kdtree_pairs(d):
    pts = sd.seed_spreader(400, d, seed=6)
    cells = _cells_pdf(pts, 300.0, d)
    a = grid.neighbor_pairs_enum(cells, d)
    b = grid.neighbor_pairs_kdtree(cells, d)
    sa = set(zip(a["cell"], a["ncell"]))
    sb = set(zip(b["cell"], b["ncell"]))
    assert sa == sb


@pytest.mark.parametrize("d", [5, 7])
def test_kdtree_pairs_match_bruteforce_gap(d):
    pts = sd.seed_spreader(200, d, seed=7)
    cells = _cells_pdf(pts, 2000.0, d)
    got = set(zip(*(grid.neighbor_pairs_kdtree(cells, d)[c] for c in ("cell", "ncell"))))
    coords = cells[[f"c{j}" for j in range(d)]].to_numpy()
    keys = cells["cell"].to_numpy()
    want = set()
    for i in range(len(coords)):
        dc = np.abs(coords - coords[i])
        gap2 = (np.maximum(dc - 1, 0) ** 2).sum(axis=1)
        for j in np.flatnonzero(gap2 <= d):
            if j != i:
                want.add((keys[i], keys[j]))
    assert got == want


def test_neighbor_pairs_single_cell():
    cells = pd.DataFrame({"cell": ["0,0"], "c0": [0], "c1": [0], "cnt": [5]})
    assert len(grid.neighbor_pairs(cells, 2)) == 0


def test_cell_boxes_contain_points(spark):
    pts = sd.seed_spreader(300, 3, seed=8)
    eps = 400.0
    df = grid.with_cells(sd.points_df(spark, pts), eps, 3)
    cells = grid.cell_table(df, 3)
    boxes = grid.cell_boxes(cells, eps, 3)
    pdf = df.toPandas().merge(boxes, on="cell")
    for j in range(3):
        assert (pdf[f"x{j}"] >= pdf[f"lo{j}"] - 1e-9).all()
        assert (pdf[f"x{j}"] <= pdf[f"lo{j}"] + pdf["side"] + 1e-9).all()
