"""Figure 10 driver: running time vs rho for approximate DBSCAN.

    spark-submit jobs/rho_sweep.py [--n 20000]
"""
import argparse
import sys

sys.path.insert(0, ".")

from jobs.common import get_spark, load_dataset  # noqa: E402


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--dataset", default="ss-simden")
    ap.add_argument("--n", type=int, default=20_000)
    ap.add_argument("--d", type=int, default=3)
    ap.add_argument("--eps", type=float, default=300.0)
    ap.add_argument("--minpts", type=int, default=100)
    ap.add_argument("--rho", type=float, nargs="+", default=[0.001, 0.01, 0.1, 1.0])
    args = ap.parse_args()

    from repro.core.dbscan import dbscan, dbscan_variant

    spark = get_spark("rho-sweep")
    df = load_dataset(spark, args.dataset, args.n, args.d)
    _, stats = dbscan(spark, df, args.eps, args.minpts, args.d, return_stats=True)
    print(f"FIG10 impl=our-exact rho=- time={stats['t_total']:.2f}s")
    for rho in args.rho:
        for impl in ("our-approx", "our-approx-qt"):
            _, stats = dbscan_variant(
                spark, df, args.eps, args.minpts, args.d, impl, rho=rho, return_stats=True
            )
            print(f"FIG10 impl={impl} rho={rho} time={stats['t_total']:.2f}s")
    spark.stop()


if __name__ == "__main__":
    main()
