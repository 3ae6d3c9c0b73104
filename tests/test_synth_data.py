"""Tests for the spatial dataset generators (repro.synth_data)."""
import numpy as np
import pytest

from repro import synth_data as sd


def _np(df):
    pdf = df.toPandas().sort_values("id")
    xcols = [c for c in pdf.columns if c.startswith("x")]
    return pdf[sorted(xcols, key=lambda c: int(c[1:]))].to_numpy()


@pytest.mark.parametrize("d", [2, 3, 5, 7])
def test_seed_spreader_shape_and_bounds(d):
    pts = sd.seed_spreader(2000, d, seed=1)
    assert pts.shape == (2000, d)
    assert pts.min() >= 0 and pts.max() <= sd._DOMAIN


def test_seed_spreader_deterministic():
    a = sd.seed_spreader(500, 3, seed=7)
    b = sd.seed_spreader(500, 3, seed=7)
    assert np.array_equal(a, b)
    c = sd.seed_spreader(500, 3, seed=8)
    assert not np.array_equal(a, c)


def test_seed_spreader_is_clustered():
    """Most points must be much denser than uniform: mean NN distance far
    below the uniform expectation."""
    pts = sd.seed_spreader(2000, 2, seed=3)
    sub = pts[:: max(1, len(pts) // 500)]
    d2 = ((sub[:, None, :] - pts[None, :, :]) ** 2).sum(axis=2)
    np.fill_diagonal(d2[: len(sub), : len(sub)], np.inf)
    d2[d2 == 0] = np.inf
    nn = np.sqrt(d2.min(axis=1))
    uniform_nn = 0.5 * sd._DOMAIN / np.sqrt(2000)
    assert np.median(nn) < uniform_nn / 5


def test_varden_has_varied_radii():
    """SS-varden spreads clusters at different radii; point spread per
    contiguous batch should vary more than simden."""
    var = sd.seed_spreader(5000, 2, seed=2, vary_density=True)
    sim = sd.seed_spreader(5000, 2, seed=2, vary_density=False)

    def batch_spread(pts):
        spans = []
        for i in range(0, len(pts) - 100, 100):
            b = pts[i : i + 100]
            spans.append(b.std(axis=0).mean())
        return np.array(spans)

    assert batch_spread(var).std() > batch_spread(sim).std()


def test_points_df_roundtrip(spark):
    arr = np.arange(12, dtype=np.float64).reshape(4, 3)
    df = sd.points_df(spark, arr)
    assert df.columns == ["id", "x0", "x1", "x2"]
    assert np.array_equal(_np(df), arr)


@pytest.mark.parametrize(
    "fn,d",
    [
        ("geolife_like", 3),
        ("cosmo50_like", 3),
        ("osm_like", 2),
        ("teraclicklog_like", 13),
        ("household_like", 7),
    ],
)
def test_realworld_analogues_shape(spark, fn, d):
    df = getattr(sd, fn)(spark, n=500, seed=0)
    arr = _np(df)
    assert arr.shape == (500, d)
    assert np.isfinite(arr).all()


def test_uniform_fill_domain(spark):
    df = sd.uniform_fill(spark, n=400, d=2, seed=0)
    arr = _np(df)
    assert arr.shape == (400, 2)
    assert arr.min() >= 0 and arr.max() <= np.sqrt(400)


def test_geolife_like_is_skewed(spark):
    arr = _np(sd.geolife_like(spark, n=2000, seed=0))
    center = np.median(arr, axis=0)
    frac_near = (np.linalg.norm(arr - center, axis=1) < sd._DOMAIN * 0.02).mean()
    assert frac_near > 0.7  # most mass concentrated in the "city"


def test_teraclicklog_like_single_cell_at_paper_eps(spark):
    """At the Table 2 parameters all points land in one grid cell."""
    arr = _np(sd.teraclicklog_like(spark, n=2000, seed=0))
    eps = 1500.0
    side = eps / np.sqrt(13)
    cells = np.floor(arr / side).astype(np.int64)
    assert len(np.unique(cells, axis=0)) == 1


def test_ss_dataframe_wrappers(spark):
    a = _np(sd.ss_simden(spark, n=300, d=2, seed=4))
    b = _np(sd.ss_varden(spark, n=300, d=2, seed=4))
    assert a.shape == (300, 2) and b.shape == (300, 2)
