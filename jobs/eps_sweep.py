"""Figure 6 driver: running time vs eps for the d>=3 implementations.

    spark-submit jobs/eps_sweep.py [--dataset ss-simden] [--n 20000]
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
    ap.add_argument("--minpts", type=int, default=100)
    ap.add_argument("--eps", type=float, nargs="+", default=[150.0, 300.0, 600.0, 1200.0])
    ap.add_argument(
        "--impls", nargs="+",
        default=["our-exact", "our-exact-qt", "our-approx", "our-approx-qt",
                 "hpdbscan-like", "pdsdbscan-like"],
    )
    args = ap.parse_args()

    from repro.baselines.hpdbscan_like import hpdbscan
    from repro.baselines.pdsdbscan_like import pdsdbscan
    from repro.core.dbscan import dbscan_variant

    spark = get_spark("eps-sweep")
    df = load_dataset(spark, args.dataset, args.n, args.d)
    for eps in args.eps:
        for impl in args.impls:
            if impl == "hpdbscan-like":
                t0 = time.perf_counter()
                hpdbscan(spark, df, eps, args.minpts, args.d).count()
                t = time.perf_counter() - t0
            elif impl == "pdsdbscan-like":
                t0 = time.perf_counter()
                pdsdbscan(spark, df, eps, args.minpts, args.d).count()
                t = time.perf_counter() - t0
            else:
                _, stats = dbscan_variant(
                    spark, df, eps, args.minpts, args.d, impl, return_stats=True
                )
                t = stats["t_total"]
            print(f"FIG6 dataset={args.dataset} eps={eps} impl={impl} time={t:.2f}s")
    spark.stop()


if __name__ == "__main__":
    main()
