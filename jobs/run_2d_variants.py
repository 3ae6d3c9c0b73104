"""Figure 11 driver: the six 2D implementations on a 2D dataset.

    spark-submit jobs/run_2d_variants.py [--dataset ss-simden] [--n 20000]
"""
import argparse
import sys

sys.path.insert(0, ".")

from jobs.common import get_spark, load_dataset  # noqa: E402

VARIANTS = [
    "our-2d-grid-bcp",
    "our-2d-grid-usec",
    "our-2d-grid-delaunay",
    "our-2d-box-bcp",
    "our-2d-box-usec",
    "our-2d-box-delaunay",
]


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--dataset", default="ss-simden")
    ap.add_argument("--n", type=int, default=20_000)
    ap.add_argument("--eps", type=float, default=300.0)
    ap.add_argument("--minpts", type=int, default=100)
    args = ap.parse_args()

    from repro.core.dbscan import dbscan_variant

    spark = get_spark("2d-variants")
    df = load_dataset(spark, args.dataset, args.n, 2)
    for v in VARIANTS:
        _, stats = dbscan_variant(spark, df, args.eps, args.minpts, 2, v, return_stats=True)
        print(
            f"FIG11 dataset={args.dataset} impl={v} time={stats['t_total']:.2f}s "
            f"clusters={stats['n_clusters']}"
        )
    spark.stop()


if __name__ == "__main__":
    main()
