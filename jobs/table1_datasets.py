"""spark-submit entrypoint for Table 1 (dataset inventory).

Usage: ``spark-submit jobs/table1_datasets.py [scale]`` — prints the table rows
recorded in EXPERIMENTS.md. Logic lives in ``repro.tables.table1_datasets`` so
tests and benchmarks drive the identical code.
"""
import os
import sys

from pyspark.sql import SparkSession

from repro.tables import table1_datasets


def main() -> None:
    spark = (
        SparkSession.builder.master(os.environ.get("SPARK_MASTER", "local[*]")).appName("table1_datasets")
        .config("spark.sql.shuffle.partitions", "64")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )
    scale = float(sys.argv[1]) if len(sys.argv) > 1 else 0.05
    print(table1_datasets.run(spark, scale=scale).to_string(index=False))
    spark.stop()


if __name__ == "__main__":
    main()
