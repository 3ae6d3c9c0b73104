"""Pointer jumping over a linked forest, as an iterative DataFrame join.

The paper's box construction (§4.2, Figure 2) finds strip boundaries by
pointer jumping: each point links to the first point more than eps/√2 to its
right; values propagate to roots in O(log n) rounds.  Here a round is a self-
join ``parent := parent.parent`` — the DataFrame translation of the PRAM
step — and terminates when every node points at a root.

``repro.core.box`` uses the numpy scan for speed (identical output, see
tests); this module exists to reproduce the parallel formulation faithfully.
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F


def pointer_jump_roots(links: DataFrame, max_rounds: int = 64) -> DataFrame:
    """Resolve each node's root in a parent forest.

    Parameters
    ----------
    links : DataFrame(node: long, parent: long) — roots have parent == node.

    Returns
    -------
    DataFrame(node, root).
    """
    cur = links.select("node", F.col("parent").alias("root"))
    for _ in range(max_rounds):
        parents = cur.select(
            F.col("node").alias("p_node"), F.col("root").alias("p_root")
        )
        nxt = (
            cur.join(parents, cur.root == parents.p_node, "left")
            .select("node", F.coalesce("p_root", "root").alias("root"))
        )
        nxt = nxt.localCheckpoint(eager=True)  # cut the growing lineage
        if nxt.join(
            cur.withColumnRenamed("root", "old_root"), "node"
        ).where(F.col("root") != F.col("old_root")).isEmpty():
            return nxt
        cur = nxt
    return cur
