"""The paper's own naive parallel baseline (§7.2, last paragraph of
"Parallel Speedup"): a parallel k-d tree where *every* point runs an
eps-neighborhood query to decide core-ness and build the point-level
eps-graph, followed by connectivity — i.e. the original Ester et al.
algorithm parallelised per point, with none of the cell-structure work
savings.  The paper reports it >10x slower than their fastest method; we
reproduce it to anchor that comparison.

The k-d tree is built once on the driver (the paper builds it in parallel;
construction is not the bottleneck here) and broadcast; queries run
data-parallel with ``mapInPandas`` over the points, emitting neighbor counts
and locally-merged spanning edges among core candidates.  The driver merges
the forests and assigns border points.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.core import grid
from repro.primitives.unionfind import UnionFind
from repro.spatial.kdtree import KDTree


def naive_dbscan(spark, points: DataFrame, eps: float, min_pts: int, d: int) -> DataFrame:
    """Run the naive pointwise baseline; output (id, is_core, clusters)."""
    xc = grid.xcols(d)
    pdf_all = points.select("id", *xc).toPandas().sort_values("id").reset_index(drop=True)
    arr = pdf_all[xc].to_numpy(dtype=np.float64)
    ids_all = pdf_all["id"].to_numpy()
    tree = KDTree(arr)
    bc = spark.sparkContext.broadcast((tree, ids_all))

    def query(iterator):
        t, ids = bc.value
        for pdf in iterator:
            q = pdf[xc].to_numpy(dtype=np.float64)
            qid = pdf["id"].to_numpy()
            rows_q, rows_p, rows_c = [], [], []
            for i in range(len(q)):
                nbr = t.query_radius(q[i], eps)
                rows_q.append(qid[i])
                rows_p.append(-1)
                rows_c.append(len(nbr))
                for j in nbr:
                    pj = int(ids[j])
                    if pj != qid[i]:
                        rows_q.append(qid[i])
                        rows_p.append(pj)
                        rows_c.append(-1)
            yield pd.DataFrame({"qid": rows_q, "pid": rows_p, "cnt": rows_c})

    raw = points.select("id", *xc).mapInPandas(query, "qid long, pid long, cnt long").cache()
    counts = raw.where("cnt >= 0").select("qid", "cnt").collect()
    core_ids = {r["qid"] for r in counts if r["cnt"] >= min_pts}
    edges = raw.where("pid >= 0").where("qid < pid").select("qid", "pid").distinct().collect()

    order = sorted(core_ids)
    pos = {v: i for i, v in enumerate(order)}
    uf = UnionFind(len(order))
    border_links = []
    for r in edges:
        a, b = r["qid"], r["pid"]
        if a in pos and b in pos:
            uf.union(pos[a], pos[b])
        elif a in pos or b in pos:
            border_links.append((a, b))
    comp_min: dict[int, int] = {}
    for v, i in pos.items():
        r_ = uf.find(i)
        if r_ not in comp_min or v < comp_min[r_]:
            comp_min[r_] = v
    labels: dict[int, set[int]] = {v: {comp_min[uf.find(i)]} for v, i in pos.items()}
    for a, b in border_links:
        nc, c = (a, b) if b in pos else (b, a)
        labels.setdefault(nc, set()).add(comp_min[uf.find(pos[c])])
    rows = [(int(v), sorted(s)) for v, s in labels.items()]
    lbl_df = spark.createDataFrame(
        pd.DataFrame({"id": [r[0] for r in rows], "clusters": [r[1] for r in rows]}),
        schema="id long, clusters array<long>",
    )
    flag_df = spark.createDataFrame(
        pd.DataFrame({"id": sorted(core_ids)}), schema="id long"
    ).withColumn("is_core", F.lit(True))
    out = (
        points.select("id")
        .join(flag_df, "id", "left")
        .join(lbl_df, "id", "left")
        .select(
            "id",
            F.coalesce("is_core", F.lit(False)).alias("is_core"),
            F.coalesce("clusters", F.array().cast("array<long>")).alias("clusters"),
        )
    )
    raw.unpersist()
    return out
