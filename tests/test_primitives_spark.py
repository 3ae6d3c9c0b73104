"""Tests for the DataFrame-level primitives (repro.primitives.*) on Spark."""
import numpy as np
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.oracle import assert_equivalent
from repro.primitives.conncomp import conncomp_hashmin, conncomp_uf
from repro.primitives.pointer_jumping import pointer_jump_roots
from repro.primitives.scans import par_filter, prefix_sum
from repro.primitives.semisort import semisort_collect, semisort_count


# ---------------------------------------------------------------- prefix sum
def test_prefix_sum_matches_numpy(spark):
    rng = np.random.default_rng(0)
    vals = rng.integers(0, 100, 50)
    pdf = pd.DataFrame({"i": np.arange(50), "v": vals})
    out = (
        prefix_sum(spark.createDataFrame(pdf), "v", "i")
        .orderBy("i")
        .toPandas()
    )
    expected = np.concatenate([[0], np.cumsum(vals)[:-1]])
    assert (out["psum"].to_numpy() == expected).all()


def test_prefix_sum_oracle(spark):
    pdf = pd.DataFrame({"i": range(20), "v": [x * 3 % 7 for x in range(20)]})
    df = prefix_sum(spark.createDataFrame(pdf), "v", "i").select("i", "psum")
    assert_equivalent(
        df,
        """
        SELECT i,
               COALESCE(SUM(v) OVER (ORDER BY i ROWS BETWEEN UNBOUNDED
                        PRECEDING AND 1 PRECEDING), 0) AS psum
        FROM t
        """,
        t=pdf,
    )


def test_prefix_sum_empty_and_single(spark):
    pdf = pd.DataFrame({"i": [7], "v": [42]})
    out = prefix_sum(spark.createDataFrame(pdf), "v", "i").toPandas()
    assert out["psum"].tolist() == [0]


# ------------------------------------------------------------------- filter
def test_par_filter(spark):
    df = spark.range(100)
    out = par_filter(df, F.col("id") % 3 == 0)
    assert out.count() == 34


# ----------------------------------------------------------------- semisort
def test_semisort_groups_and_count(spark):
    pdf = pd.DataFrame({"k": [1, 2, 1, 3, 2, 1], "v": [10, 20, 11, 30, 21, 12]})
    grouped, n_groups = semisort_count(spark.createDataFrame(pdf), "k")
    assert n_groups == 3
    counts = {r["k"]: r["cnt"] for r in grouped.collect()}
    assert counts == {1: 3, 2: 2, 3: 1}


def test_semisort_collect_preserves_multiset(spark):
    pdf = pd.DataFrame({"k": [1, 1, 2], "v": [5, 5, 9]})
    rows = semisort_collect(spark.createDataFrame(pdf), "k", "v").collect()
    got = {r["k"]: sorted(r["values"]) for r in rows}
    assert got == {1: [5, 5], 2: [9]}


def test_semisort_oracle(spark):
    rng = np.random.default_rng(1)
    pdf = pd.DataFrame({"k": rng.integers(0, 10, 200), "v": rng.random(200)})
    grouped, _ = semisort_count(spark.createDataFrame(pdf), "k")
    assert_equivalent(
        grouped.select("k", "cnt"),
        "SELECT k, COUNT(*) AS cnt FROM t GROUP BY k",
        t=pdf,
    )


# --------------------------------------------------------- pointer jumping
def _links_df(spark, parents):
    return spark.createDataFrame(
        pd.DataFrame({"node": range(len(parents)), "parent": parents})
    )


def test_pointer_jumping_chain(spark):
    # 0 <- 1 <- 2 <- ... <- 9 (node i's parent is i-1; 0 is root)
    parents = [0] + list(range(9))
    out = pointer_jump_roots(_links_df(spark, parents))
    roots = {r["node"]: r["root"] for r in out.collect()}
    assert all(roots[i] == 0 for i in range(10))


def test_pointer_jumping_forest(spark):
    # Two trees: root 0 (1,2 point in) and root 3 (4 -> 3, 5 -> 4)
    parents = [0, 0, 0, 3, 3, 4]
    out = pointer_jump_roots(_links_df(spark, parents))
    roots = {r["node"]: r["root"] for r in out.collect()}
    assert roots == {0: 0, 1: 0, 2: 0, 3: 3, 4: 3, 5: 3}


def test_pointer_jumping_all_roots(spark):
    parents = [0, 1, 2, 3]
    out = pointer_jump_roots(_links_df(spark, parents))
    roots = {r["node"]: r["root"] for r in out.collect()}
    assert roots == {0: 0, 1: 1, 2: 2, 3: 3}


# ----------------------------------------------------- connected components
def test_conncomp_uf_basic():
    labels = conncomp_uf(5, [(0, 1), (3, 4)])
    assert labels == [0, 0, 2, 3, 3]


def test_conncomp_uf_empty_edges():
    assert conncomp_uf(3, []) == [0, 1, 2]


def _edges_df(spark, edges):
    return spark.createDataFrame(
        pd.DataFrame({"src": [a for a, _ in edges], "dst": [b for _, b in edges]})
    )


def _verts_df(spark, n):
    return spark.createDataFrame(pd.DataFrame({"v": range(n)}))


def test_hashmin_matches_uf_random(spark):
    rng = np.random.default_rng(5)
    n = 40
    edges = [tuple(map(int, rng.integers(0, n, 2))) for _ in range(30)]
    want = conncomp_uf(n, edges)
    got_rows = conncomp_hashmin(spark, _verts_df(spark, n), _edges_df(spark, edges)).collect()
    got = {r["v"]: r["comp"] for r in got_rows}
    assert [got[i] for i in range(n)] == want


def test_hashmin_long_path(spark):
    n = 33
    edges = [(i, i + 1) for i in range(n - 1)]
    got_rows = conncomp_hashmin(spark, _verts_df(spark, n), _edges_df(spark, edges)).collect()
    assert all(r["comp"] == 0 for r in got_rows)


def test_hashmin_oracle_recursive_cte(spark):
    """Cross-check hash-min CC against DuckDB transitive closure."""
    edges = [(0, 1), (1, 2), (5, 6), (7, 7)]
    n = 8
    out = conncomp_hashmin(spark, _verts_df(spark, n), _edges_df(spark, edges))
    verts = pd.DataFrame({"v": range(n)})
    edf = pd.DataFrame({"src": [a for a, _ in edges], "dst": [b for _, b in edges]})
    assert_equivalent(
        out.select("v", "comp"),
        """
        WITH RECURSIVE sym AS (
            SELECT src, dst FROM e UNION SELECT dst, src FROM e
        ), reach(v, r) AS (
            SELECT v, v FROM verts
            UNION
            SELECT reach.v, sym.dst FROM reach JOIN sym ON reach.r = sym.src
        )
        SELECT v, MIN(r) AS comp FROM reach GROUP BY v
        """,
        verts=verts,
        e=edf,
    )
