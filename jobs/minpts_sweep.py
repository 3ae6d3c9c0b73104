"""Figure 7 driver: running time vs minPts.

    spark-submit jobs/minpts_sweep.py [--n 20000]
"""
import argparse
import sys
import time

sys.path.insert(0, ".")

from jobs.common import get_spark, load_dataset  # noqa: E402


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--dataset", default="ss-simden")
    ap.add_argument("--n", type=int, default=20_000)
    ap.add_argument("--d", type=int, default=3)
    ap.add_argument("--eps", type=float, default=300.0)
    ap.add_argument("--minpts", type=int, nargs="+", default=[10, 100, 1000, 5000])
    args = ap.parse_args()

    from repro.baselines.hpdbscan_like import hpdbscan
    from repro.core.dbscan import dbscan

    spark = get_spark("minpts-sweep")
    df = load_dataset(spark, args.dataset, args.n, args.d)
    for mp in args.minpts:
        _, stats = dbscan(spark, df, args.eps, mp, args.d, return_stats=True)
        print(f"FIG7 dataset={args.dataset} minPts={mp} impl=our-exact time={stats['t_total']:.2f}s")
        t0 = time.perf_counter()
        hpdbscan(spark, df, args.eps, mp, args.d).count()
        print(
            f"FIG7 dataset={args.dataset} minPts={mp} impl=hpdbscan-like "
            f"time={time.perf_counter() - t0:.2f}s"
        )
    spark.stop()


if __name__ == "__main__":
    main()
