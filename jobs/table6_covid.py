"""spark-submit entrypoint for Table 6 (COVID-19 before/after).

Usage: ``spark-submit jobs/table6_covid.py [scale]`` — prints the table rows
recorded in EXPERIMENTS.md. Logic lives in ``repro.tables.table6_covid`` so
tests and benchmarks drive the identical code.
"""
import os
import sys

from pyspark.sql import SparkSession

from repro.tables import table6_covid


def main() -> None:
    spark = (
        SparkSession.builder.master(os.environ.get("SPARK_MASTER", "local[*]")).appName("table6_covid")
        .config("spark.sql.shuffle.partitions", "64")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )
    scale = float(sys.argv[1]) if len(sys.argv) > 1 else 0.25
    levels, caps = table6_covid.run(spark, scale=scale)
    print(levels.to_string(index=False))
    print(caps.to_string(index=False))
    spark.stop()


if __name__ == "__main__":
    main()
