"""Shared SparkSession builder for the spark-submit job entrypoints.

Jobs run standalone (outside pytest), so they create their own session
with the same settings the test fixture uses; under spark-submit the
master/memory come from the submit command instead.
"""
import os


def get_spark(app: str):
    os.environ.setdefault(
        "PYSPARK_SUBMIT_ARGS",
        "--master local[*] --driver-memory 8g "
        "--conf spark.driver.host=127.0.0.1 "
        "--conf spark.ui.enabled=false pyspark-shell",
    )
    from pyspark.sql import SparkSession

    s = (
        SparkSession.builder.appName(app)
        .config("spark.sql.shuffle.partitions", "16")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .config("spark.ui.showConsoleProgress", "false")
        .getOrCreate()
    )
    s.sparkContext.setLogLevel("ERROR")
    return s


#: benchmark scale per dataset — sized so the pool-size effects that
#: drive Table 4 (AL pools, TransER's kNN, Sudowoodo's pretraining)
#: are visible at every dataset
BENCH_SCALE = {"dexter": 1.5, "wdc": 2.0, "music": 1.5}
