#!/usr/bin/env python
"""Reproduce paper Table 6: runtime of distributed algorithms over
row-block-partitioned DataFrames (L2SVM, MLogreg, GLM, KMeans ×
Base / Fused / Gen / Gen-FA / Gen-FNR). Entry point for spark-submit;
creates a local[*] session when run directly."""
import os
import sys


def main() -> int:
    mem = os.environ.get("SPARK_DRIVER_MEM", "24g")
    os.environ.setdefault(
        "PYSPARK_SUBMIT_ARGS",
        f"--master local[*] --driver-memory {mem} "
        "--conf spark.driver.host=127.0.0.1 "
        "--conf spark.ui.enabled=false pyspark-shell",
    )
    from pyspark.sql import SparkSession

    from repro.experiments import format_rows, table6_rows

    spark = (
        SparkSession.builder.appName("repro-table6")
        .config("spark.sql.shuffle.partitions", "32")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .getOrCreate()
    )
    try:
        rows = table6_rows(spark)
        print("Table 6: Runtime of Distributed Algorithms [s]")
        print(
            format_rows(rows, ["algorithm", "data", "Base", "Fused", "Gen", "FA", "FNR"])
        )
    finally:
        spark.stop()
    return 0


if __name__ == "__main__":
    sys.exit(main())
