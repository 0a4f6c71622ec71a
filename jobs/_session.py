"""Shared SparkSession builder for spark-submit job entrypoints.

Jobs are standalone (``spark-submit jobs/tableN_*.py`` or plain
``python jobs/tableN_*.py``); tests and benchmarks use the conftest
``spark`` fixture instead. Flags: ``--quick`` shrinks every scenario,
``--only NAME`` restricts to one dataset.
"""
import argparse
import os
import sys


def get_spark(app: str):
    os.environ.setdefault(
        "PYSPARK_SUBMIT_ARGS",
        f"--master {os.environ.get('SPARK_MASTER', 'local[*]')} "
        f"--driver-memory {os.environ.get('SPARK_DRIVER_MEM', '8g')} "
        "--conf spark.driver.host=127.0.0.1 "
        "--conf spark.ui.enabled=false pyspark-shell",
    )
    from pyspark.sql import SparkSession

    s = (SparkSession.builder.appName(app)
         .config("spark.sql.shuffle.partitions",
                 os.environ.get("SPARK_SHUFFLE_PARTITIONS", "8"))
         .config("spark.sql.execution.arrow.pyspark.enabled", "true")
         .getOrCreate())
    s.sparkContext.setLogLevel("ERROR")
    return s


def job_main(app: str, run_fn):
    ap = argparse.ArgumentParser(description=app)
    ap.add_argument("--quick", action="store_true", help="small smoke-scale run")
    ap.add_argument("--only", nargs="*", default=None, help="subset of datasets")
    args = ap.parse_args()
    spark = get_spark(app)
    try:
        df = run_fn(spark, quick=args.quick, only=args.only)
        with __import__("pandas").option_context("display.width", 200,
                                                 "display.max_columns", 50):
            print(df.to_string(index=False))
    finally:
        spark.stop()
    return 0


if __name__ == "__main__":
    sys.exit("this module is a helper; run one of the tableN_*.py jobs")
