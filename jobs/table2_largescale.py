"""Table 2 driver: our-exact vs rpdbscan-like over the four large-dataset
analogues and eps ladders; prints one row per (dataset, eps, impl).

    spark-submit jobs/table2_largescale.py [--n 30000]
"""
import argparse
import sys
import time

sys.path.insert(0, ".")

from jobs.common import get_spark, load_dataset  # noqa: E402

CASES = [
    ("geolife", 3, [20.0, 40.0, 80.0, 160.0], True),
    ("cosmo50", 3, [100.0, 200.0, 400.0, 800.0], False),
    ("osm", 2, [100.0, 200.0, 400.0, 800.0], False),
    ("teraclicklog", 13, [1500.0, 3000.0, 6000.0, 12000.0], False),
]


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--n", type=int, default=30_000)
    ap.add_argument("--skip-rpdbscan", action="store_true")
    args = ap.parse_args()

    from repro.baselines.rpdbscan_like import rpdbscan
    from repro.core.dbscan import dbscan

    spark = get_spark("table2")
    for name, d, epss, bucketing in CASES:
        df = load_dataset(spark, name, args.n, d)
        for eps in epss:
            res, stats = dbscan(spark, df, eps, 100, d, bucketing=bucketing, return_stats=True)
            impl = "our-exact" + ("-bucketing" if bucketing else "")
            print(
                f"TABLE2 dataset={name} eps={eps} impl={impl} "
                f"time={stats['t_total']:.2f}s clusters={stats['n_clusters']}"
            )
            if not args.skip_rpdbscan:
                t0 = time.perf_counter()
                rpdbscan(spark, df, eps, 100, d).count()
                print(
                    f"TABLE2 dataset={name} eps={eps} impl=rpdbscan-like "
                    f"time={time.perf_counter() - t0:.2f}s"
                )
        df.unpersist()
    spark.stop()


if __name__ == "__main__":
    main()
