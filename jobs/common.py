"""Shared helpers for spark-submit job entrypoints.

Each job builds its own SparkSession (they run standalone via spark-submit
or plain python, not under the pytest fixture).  ``--master`` can be
overridden through the SPARK_MASTER environment variable, which is how
``speedup_sweep.py`` runs the same job under local[1], local[2], ...
"""
from __future__ import annotations

import os

# spark.driver.memory is read at JVM launch, not from SparkConf, so it must
# be in PYSPARK_SUBMIT_ARGS before pyspark is imported (same trick as the
# repo-root conftest.py).
os.environ.setdefault(
    "PYSPARK_SUBMIT_ARGS",
    f"--master {os.environ.get('SPARK_MASTER', 'local[*]')} "
    f"--driver-memory {os.environ.get('SPARK_DRIVER_MEM', '24g')} "
    "--conf spark.driver.host=127.0.0.1 --conf spark.ui.enabled=false "
    "pyspark-shell",
)

from pyspark.sql import SparkSession  # noqa: E402


def get_spark(app: str) -> SparkSession:
    s = (
        SparkSession.builder.appName(app)
        .master(os.environ.get("SPARK_MASTER", "local[*]"))
        .config("spark.sql.shuffle.partitions", os.environ.get("SPARK_SHUFFLE_PARTITIONS", "64"))
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .config("spark.driver.host", "127.0.0.1")
        .config("spark.ui.enabled", "false")
        .getOrCreate()
    )
    s.sparkContext.setLogLevel("ERROR")
    return s


DATASETS = {
    "ss-simden": lambda sd, spark, n, d: sd.ss_simden(spark, n=n, d=d),
    "ss-varden": lambda sd, spark, n, d: sd.ss_varden(spark, n=n, d=d),
    "uniform": lambda sd, spark, n, d: sd.uniform_fill(spark, n=n, d=d),
    "geolife": lambda sd, spark, n, d: sd.geolife_like(spark, n=n),
    "cosmo50": lambda sd, spark, n, d: sd.cosmo50_like(spark, n=n),
    "osm": lambda sd, spark, n, d: sd.osm_like(spark, n=n),
    "teraclicklog": lambda sd, spark, n, d: sd.teraclicklog_like(spark, n=n),
    "household": lambda sd, spark, n, d: sd.household_like(spark, n=n),
}


def load_dataset(spark, name: str, n: int, d: int):
    from repro import synth_data as sd

    df = DATASETS[name](sd, spark, n, d).cache()
    df.count()
    return df
