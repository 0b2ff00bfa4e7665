"""spark-submit entrypoint for Table 3 (caching mechanism).

Usage: ``spark-submit jobs/table3_cache.py [scale]`` — prints the table rows
recorded in EXPERIMENTS.md. Logic lives in ``repro.tables.table3_cache`` so
tests and benchmarks drive the identical code.
"""
import os
import sys

from pyspark.sql import SparkSession

from repro.tables import table3_cache


def main() -> None:
    spark = (
        SparkSession.builder.master(os.environ.get("SPARK_MASTER", "local[*]")).appName("table3_cache")
        .config("spark.sql.shuffle.partitions", "64")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )
    scale = float(sys.argv[1]) if len(sys.argv) > 1 else 0.05
    print(table3_cache.run(spark, scale=scale).to_string(index=False))
    spark.stop()


if __name__ == "__main__":
    main()
