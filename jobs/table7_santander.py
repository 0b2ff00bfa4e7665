"""spark-submit entrypoint for Table 7 (Santander case study).

Usage: ``spark-submit jobs/table7_santander.py [scale]`` — prints the table rows
recorded in EXPERIMENTS.md. Logic lives in ``repro.tables.table7_santander`` so
tests and benchmarks drive the identical code.
"""
import os
import sys

from pyspark.sql import SparkSession

from repro.tables import table7_santander


def main() -> None:
    spark = (
        SparkSession.builder.master(os.environ.get("SPARK_MASTER", "local[*]")).appName("table7_santander")
        .config("spark.sql.shuffle.partitions", "64")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )
    scale = float(sys.argv[1]) if len(sys.argv) > 1 else 0.05
    df = table7_santander.run(spark, scale=scale)
    print(df.to_string(index=False))
    print("paper_patterns:", table7_santander.contains_paper_patterns(df))
    spark.stop()


if __name__ == "__main__":
    main()
