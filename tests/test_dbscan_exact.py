"""End-to-end exact DBSCAN pipeline tests vs the brute-force reference."""
import numpy as np
import pytest

from repro import synth_data as sd
from repro.core.dbscan import dbscan, dbscan_variant
from repro.core.validate import assert_same_clustering, canonical_labels, result_to_pandas


def _run_and_check(spark, pts, eps, min_pts, d, **kw):
    res = dbscan(spark, sd.points_df(spark, pts), eps, min_pts, d, **kw)
    assert_same_clustering(res, pts, eps, min_pts)
    return res


@pytest.mark.parametrize("d", [2, 3])
@pytest.mark.parametrize("gen", ["simden", "varden"])
def test_seed_spreader_datasets(spark, d, gen):
    pts = sd.seed_spreader(400, d, seed=d * 7, vary_density=(gen == "varden"))
    _run_and_check(spark, pts, 300.0 * np.sqrt(d), 10, d)


@pytest.mark.parametrize("d", [5, 7])
def test_higher_dims(spark, d):
    pts = sd.seed_spreader(250, d, seed=d, noise_frac=0.01)
    _run_and_check(spark, pts, 600.0 * np.sqrt(d), 8, d)


def test_uniform_points(spark):
    rng = np.random.default_rng(0)
    pts = rng.random((300, 2)) * np.sqrt(300)
    _run_and_check(spark, pts, 1.0, 8, 2)


@pytest.mark.parametrize("min_pts", [1, 2, 5, 50])
def test_minpts_sweep(spark, min_pts):
    pts = sd.seed_spreader(300, 2, seed=21)
    _run_and_check(spark, pts, 250.0, min_pts, 2)


def test_minpts_one_no_noise(spark):
    pts = sd.seed_spreader(150, 2, seed=22)
    res = _run_and_check(spark, pts, 200.0, 1, 2)
    pdf = result_to_pandas(res)
    assert pdf["is_core"].all()
    assert (pdf["clusters"].apply(len) == 1).all()


def test_eps_tiny_all_noise(spark):
    rng = np.random.default_rng(1)
    pts = rng.random((200, 2)) * 1000
    res = _run_and_check(spark, pts, 0.001, 2, 2)
    pdf = result_to_pandas(res)
    assert not pdf["is_core"].any()
    assert (pdf["clusters"].apply(len) == 0).all()


def test_eps_huge_single_cluster(spark):
    pts = sd.seed_spreader(200, 3, seed=23)
    res = _run_and_check(spark, pts, 1e6, 5, 3)
    pdf = result_to_pandas(res)
    labels = canonical_labels(pdf)
    assert len({next(iter(l)) for l in labels}) == 1


def test_single_point(spark):
    pts = np.array([[1.0, 2.0]])
    res = _run_and_check(spark, pts, 1.0, 1, 2)
    pdf = result_to_pandas(res)
    assert pdf["is_core"].tolist() == [True]


def test_single_point_noise(spark):
    pts = np.array([[1.0, 2.0]])
    res = _run_and_check(spark, pts, 1.0, 2, 2)
    pdf = result_to_pandas(res)
    assert pdf["is_core"].tolist() == [False]
    assert pdf["clusters"].tolist() == [()]


def test_duplicate_points(spark):
    pts = np.vstack(
        [np.tile([[5.0, 5.0]], (30, 1)), np.tile([[50.0, 50.0]], (30, 1)), [[500.0, 500.0]]]
    )
    _run_and_check(spark, pts, 2.0, 10, 2)


def test_two_clusters_bridged_by_border(spark):
    """Classic construction: a border point within eps of two clusters must
    belong to both (multi-membership)."""
    # Two line clusters whose inner endpoints are exactly eps from the
    # bridge; the bridge sees only 2 other points, far below minPts, so it
    # stays non-core while touching a core point of each cluster.
    left = np.stack([np.linspace(-4.0, 0.0, 40), np.zeros(40)], axis=1)
    right = np.stack([np.linspace(10.0, 14.0, 40), np.zeros(40)], axis=1)
    bridge = np.array([[5.0, 0.0]])
    pts = np.vstack([left, right, bridge])
    res = _run_and_check(spark, pts, 5.0, 40, 2)
    pdf = result_to_pandas(res)
    assert len(pdf.loc[80, "clusters"]) == 2
    assert not pdf.loc[80, "is_core"]


def test_exactly_eps_connectivity(spark):
    """Two tight clumps whose closest points are exactly eps apart must merge
    (the definition is inclusive)."""
    a = np.tile([[0.0, 0.0]], (10, 1))
    b = np.tile([[3.0, 4.0]], (10, 1))
    pts = np.vstack([a, b])
    res = _run_and_check(spark, pts, 5.0, 5, 2)
    pdf = result_to_pandas(res)
    labels = canonical_labels(pdf)
    assert labels[0] == labels[10]


def test_variant_qt_matches(spark):
    pts = sd.seed_spreader(350, 3, seed=25)
    res = dbscan_variant(spark, sd.points_df(spark, pts), 400.0, 10, 3, "our-exact-qt")
    assert_same_clustering(res, pts, 400.0, 10)


def test_variant_bucketing_matches(spark):
    pts = sd.seed_spreader(350, 3, seed=26)
    res = dbscan_variant(
        spark, sd.points_df(spark, pts), 400.0, 10, 3, "our-exact-qt-bucketing"
    )
    assert_same_clustering(res, pts, 400.0, 10)


def test_geolife_like_skewed(spark):
    df = sd.geolife_like(spark, n=600, seed=1)
    pts = df.toPandas().sort_values("id")[["x0", "x1", "x2"]].to_numpy()
    res = dbscan(spark, df, 400.0, 10, 3)
    assert_same_clustering(res, pts, 400.0, 10)


def test_teraclicklog_like_single_cell(spark):
    df = sd.teraclicklog_like(spark, n=300, seed=1)
    pts = df.toPandas().sort_values("id")[[f"x{j}" for j in range(13)]].to_numpy()
    res, stats = dbscan(spark, df, 1500.0, 100, 13, return_stats=True)
    assert stats["n_cells"] == 1
    assert_same_clustering(res, pts, 1500.0, 100)


def test_stats_present(spark):
    pts = sd.seed_spreader(200, 2, seed=27)
    res, stats = dbscan(spark, sd.points_df(spark, pts), 250.0, 8, 2, return_stats=True)
    for k in ("n_cells", "t_cells", "t_markcore", "t_clustercore", "t_border", "t_total",
              "n_core_cells", "n_candidate_edges", "n_clusters"):
        assert k in stats
    assert stats["t_total"] > 0


def test_deterministic_across_runs(spark):
    pts = sd.seed_spreader(250, 2, seed=28)
    df = sd.points_df(spark, pts)
    a = result_to_pandas(dbscan(spark, df, 250.0, 8, 2))
    b = result_to_pandas(dbscan(spark, df, 250.0, 8, 2))
    assert canonical_labels(a) == canonical_labels(b)
    assert a["is_core"].tolist() == b["is_core"].tolist()
