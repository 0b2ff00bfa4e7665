"""spark-submit entrypoint for Table 2 (parameter sensitivity).

Usage: ``spark-submit jobs/table2_param_sweep.py [scale]`` — prints the table rows
recorded in EXPERIMENTS.md. Logic lives in ``repro.tables.table2_param_sweep`` so
tests and benchmarks drive the identical code.
"""
import os
import sys

from pyspark.sql import SparkSession

from repro.tables import table2_param_sweep


def main() -> None:
    spark = (
        SparkSession.builder.master(os.environ.get("SPARK_MASTER", "local[*]")).appName("table2_param_sweep")
        .config("spark.sql.shuffle.partitions", "64")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )
    scale = float(sys.argv[1]) if len(sys.argv) > 1 else 0.05
    df = table2_param_sweep.run(spark, scale=scale)
    print(df.to_string(index=False))
    print("directions_ok:", table2_param_sweep.direction_ok(df))
    spark.stop()


if __name__ == "__main__":
    main()
