"""spark-submit entrypoint for Table 5 (China wind-direction case).

Usage: ``spark-submit jobs/table5_wind.py [scale]`` — prints the table rows
recorded in EXPERIMENTS.md. Logic lives in ``repro.tables.table5_wind`` so
tests and benchmarks drive the identical code.
"""
import os
import sys

from pyspark.sql import SparkSession

from repro.tables import table5_wind


def main() -> None:
    spark = (
        SparkSession.builder.master(os.environ.get("SPARK_MASTER", "local[*]")).appName("table5_wind")
        .config("spark.sql.shuffle.partitions", "64")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )
    scale = float(sys.argv[1]) if len(sys.argv) > 1 else 0.008
    print(table5_wind.run(spark, scale=scale).to_string(index=False))
    spark.stop()


if __name__ == "__main__":
    main()
