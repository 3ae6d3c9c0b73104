"""End-to-end parallel DBSCAN pipelines (Algorithm 1) on Spark.

``dbscan`` composes the phases — cell construction (grid §4.1 or box §4.2),
MarkCore (Alg. 2), ClusterCore (Alg. 3 with BCP / quadtree / USEC / Delaunay
/ approximate connectivity), connected components, ClusterBorder (Alg. 4) —
into the paper's named implementations:

=================  ========================================================
paper name          dbscan(...) arguments
-----------------  --------------------------------------------------------
our-exact           graph_method="bcp"
our-exact-qt        graph_method="qt", markcore_quadtree=True
our-approx          approx=True  (graph approx, markcore scan)
our-approx-qt       approx=True, markcore_quadtree=True
*-bucketing         bucketing=True
our-2d-grid-*       d=2, cell_method="grid", graph_method in {bcp,usec,delaunay}
our-2d-box-*        d=2, cell_method="box",  graph_method in {bcp,usec,delaunay}
=================  ========================================================

Output: DataFrame (id, is_core, clusters array<long>) — empty array = noise;
border points may carry several labels.  Cluster labels are canonical core-
cell component indices; tests canonicalise further to min-core-point ids.
"""
from __future__ import annotations

import time

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.core import box as boxmod
from repro.core import grid
from repro.core.border import cluster_border
from repro.core.cellgraph import build_cell_graph
from repro.core.mark_core import mark_core


def dbscan(
    spark: SparkSession,
    points: DataFrame,
    eps: float,
    min_pts: int,
    d: int,
    *,
    cell_method: str = "grid",
    graph_method: str = "bcp",
    markcore_quadtree: bool = False,
    approx: bool = False,
    rho: float = 0.01,
    bucketing: bool = False,
    return_stats: bool = False,
):
    """Run parallel DBSCAN; see module docstring for the variant matrix."""
    t0 = time.perf_counter()
    xc = grid.xcols(d)
    stats: dict[str, object] = {}

    # ---- cells ----------------------------------------------------------
    if cell_method == "grid":
        pts_cells = grid.with_cells(points, eps, d).select("id", *xc, *grid.ccols(d), "cell")
        pts_cells = pts_cells.cache()
        cells = grid.cell_table(pts_cells, d)
        npairs = grid.neighbor_pairs(cells, d)
        boxes = grid.cell_boxes(cells, eps, d)
        pts_cells = pts_cells.select("id", *xc, "cell")
    elif cell_method == "box":
        if d != 2:
            raise ValueError("box construction is 2D only")
        pdf = points.select("id", *xc).toPandas().sort_values("id")
        labels, box_tbl = boxmod.box_cells(pdf[xc].to_numpy(), eps)
        assign = pd.DataFrame({"id": pdf["id"].to_numpy(), "cell": "b" + pd.Series(labels).astype(str)})
        pts_cells = points.join(spark.createDataFrame(assign), "id").select("id", *xc, "cell")
        pts_cells = pts_cells.cache()
        cells = pd.DataFrame({"cell": "b" + box_tbl["box"].astype(str), "cnt": box_tbl["cnt"]})
        npairs = boxmod.box_neighbor_pairs(box_tbl, eps)
        boxes = pd.DataFrame(
            {
                "cell": "b" + box_tbl["box"].astype(str),
                "lo0": box_tbl["lo0"],
                "lo1": box_tbl["lo1"],
                "side": box_tbl["side"],
            }
        )
    else:
        raise ValueError(cell_method)
    t1 = time.perf_counter()
    stats["n_cells"] = len(cells)
    stats["t_cells"] = t1 - t0

    # ---- mark core ------------------------------------------------------
    flags = mark_core(
        spark, pts_cells, d, eps, min_pts, npairs, boxes, use_quadtree=markcore_quadtree
    ).cache()
    flags.count()
    t2 = time.perf_counter()
    stats["t_markcore"] = t2 - t1

    # ---- cluster core ---------------------------------------------------
    core_pts = (
        pts_cells.join(flags.where("is_core").select("id"), "id")
        .select("id", "cell", *xc)
        .cache()
    )
    core_cells = (
        core_pts.groupBy("cell").agg(F.count("*").alias("core_cnt")).toPandas()
    )
    gmethod = "approx" if approx else graph_method
    labels, gstats = build_cell_graph(
        spark,
        core_pts.select("cell", *xc),
        core_cells,
        npairs,
        boxes,
        d,
        eps,
        method=gmethod,
        rho=rho,
        bucketing=bucketing,
    )
    stats.update(gstats)
    lbl_df = spark.createDataFrame(
        pd.DataFrame(
            {"cell": list(labels), "cluster": [labels[c] for c in labels]}
        ),
        schema="cell string, cluster long",
    )
    core_clustered = core_pts.join(lbl_df, "cell").select("id", "cell", *xc, "cluster").cache()
    t3 = time.perf_counter()
    stats["t_clustercore"] = t3 - t2

    # ---- cluster border -------------------------------------------------
    border = cluster_border(spark, pts_cells, flags, core_clustered, d, eps, npairs)
    core_out = core_clustered.select("id", F.array(F.col("cluster")).alias("clusters"))
    assigned = core_out.unionByName(border)
    result = (
        points.select("id")
        .join(flags, "id", "left")
        .join(assigned, "id", "left")
        .select(
            "id",
            F.coalesce("is_core", F.lit(False)).alias("is_core"),
            F.coalesce("clusters", F.array().cast("array<long>")).alias("clusters"),
        )
    ).cache()
    result.count()
    t4 = time.perf_counter()
    stats["t_border"] = t4 - t3
    stats["t_total"] = t4 - t0

    pts_cells.unpersist()
    if return_stats:
        return result, stats
    return result


VARIANTS = {
    "our-exact": dict(graph_method="bcp"),
    "our-exact-qt": dict(graph_method="qt", markcore_quadtree=True),
    "our-approx": dict(approx=True),
    "our-approx-qt": dict(approx=True, markcore_quadtree=True),
    "our-exact-bucketing": dict(graph_method="bcp", bucketing=True),
    "our-exact-qt-bucketing": dict(graph_method="qt", markcore_quadtree=True, bucketing=True),
    "our-approx-bucketing": dict(approx=True, bucketing=True),
    "our-approx-qt-bucketing": dict(approx=True, markcore_quadtree=True, bucketing=True),
    "our-2d-grid-bcp": dict(cell_method="grid", graph_method="bcp"),
    "our-2d-grid-usec": dict(cell_method="grid", graph_method="usec"),
    "our-2d-grid-delaunay": dict(cell_method="grid", graph_method="delaunay"),
    "our-2d-box-bcp": dict(cell_method="box", graph_method="bcp"),
    "our-2d-box-usec": dict(cell_method="box", graph_method="usec"),
    "our-2d-box-delaunay": dict(cell_method="box", graph_method="delaunay"),
}


def dbscan_variant(spark, points, eps, min_pts, d, variant: str, **extra):
    """Run one of the paper's named implementations (see VARIANTS)."""
    kw = dict(VARIANTS[variant])
    kw.update(extra)
    return dbscan(spark, points, eps, min_pts, d, **kw)
