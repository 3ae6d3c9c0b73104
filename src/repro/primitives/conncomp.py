"""Connected components of the cell graph (§4.4, §6.1).

Two interchangeable implementations, tested against each other:

* ``conncomp_uf`` — driver-side union-find.  The cell graph has one vertex
  per non-empty core cell, orders of magnitude smaller than the point set,
  so this is the production path (the paper's lock-free parallel UF serves
  the same cell-scale role).
* ``conncomp_hashmin`` — distributed hash-min label propagation over
  DataFrames: every vertex repeatedly adopts the minimum label in its closed
  neighbourhood until fixpoint.  O(diameter) rounds; faithful to running CC
  "in parallel" and used as a cross-check and for arbitrarily large cell
  graphs.
"""
from __future__ import annotations

from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.primitives.unionfind import UnionFind


def conncomp_uf(n: int, edges: list[tuple[int, int]]) -> list[int]:
    """Component label (min-reachable style root id) per vertex 0..n-1."""
    uf = UnionFind(n)
    for a, b in edges:
        uf.union(a, b)
    # Canonicalise roots to the minimum vertex id in each component so the
    # labels are deterministic across runs.
    root_min: dict[int, int] = {}
    for v in range(n):
        r = uf.find(v)
        if r not in root_min or v < root_min[r]:
            root_min[r] = v
    return [root_min[uf.find(v)] for v in range(n)]


def conncomp_hashmin(
    spark: SparkSession, vertices: DataFrame, edges: DataFrame, max_rounds: int = 64
) -> DataFrame:
    """Hash-min connected components.

    Parameters
    ----------
    vertices : DataFrame(v: long)
    edges    : DataFrame(src: long, dst: long), undirected (either order).

    Returns
    -------
    DataFrame(v, comp) where comp is the minimum vertex id in v's component.
    """
    sym = edges.select("src", "dst").union(
        edges.select(F.col("dst").alias("src"), F.col("src").alias("dst"))
    )
    labels = vertices.select("v", F.col("v").alias("comp"))
    for _ in range(max_rounds):
        nbr_min = (
            sym.join(labels, sym.dst == labels.v)
            .groupBy("src")
            .agg(F.min("comp").alias("nbr_comp"))
            .withColumnRenamed("src", "v2")
        )
        nxt = (
            labels.join(nbr_min, labels.v == nbr_min.v2, "left")
            .select("v", F.least("comp", F.coalesce("nbr_comp", "comp")).alias("comp"))
        )
        nxt = nxt.localCheckpoint(eager=True)
        changed = (
            nxt.withColumnRenamed("comp", "new_comp")
            .join(labels, "v")
            .where(F.col("new_comp") != F.col("comp"))
        )
        if changed.isEmpty():
            return nxt
        labels = nxt
    return labels
