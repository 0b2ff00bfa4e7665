"""Generic CAP-mining job: upload a §3.2 CSV bundle (or use a stored
dataset) and run MISCELA with user parameters — the demo's core flow as
a spark-submit entrypoint.

Usage::

    spark-submit jobs/mine_dataset.py <store_root> <dataset> [csv_dir] \
        [epsilon] [eta_meters] [mu] [psi]

If ``csv_dir`` is given the bundle is uploaded first (chunked, §3.2);
otherwise the dataset must already exist in the store. Results print as
the CAP table and are cached per §3.3 — re-running with the same
parameters is served from the cache.
"""
import os
import sys

from pyspark.sql import SparkSession

from repro.core.types import MiscelaParams
from repro.server import MiscelaApi


def main() -> None:
    if len(sys.argv) < 3:
        print(__doc__)
        sys.exit(2)
    store_root, dataset = sys.argv[1], sys.argv[2]
    csv_dir = sys.argv[3] if len(sys.argv) > 3 else None
    params = MiscelaParams(
        epsilon=float(sys.argv[4]) if len(sys.argv) > 4 else 0.05,
        eta_meters=float(sys.argv[5]) if len(sys.argv) > 5 else 800.0,
        mu=int(sys.argv[6]) if len(sys.argv) > 6 else 3,
        psi=int(sys.argv[7]) if len(sys.argv) > 7 else 8,
    )
    spark = (
        SparkSession.builder.master(os.environ.get("SPARK_MASTER", "local[*]")).appName("mine_dataset")
        .config("spark.sql.shuffle.partitions", "64")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .getOrCreate()
    )
    api = MiscelaApi(spark, store_root)
    if csv_dir:
        print("upload:", api.upload(dataset, csv_dir))
    r = api.mine(dataset, params)
    print(f"{r.n_caps} CAPs (from_cache={r.from_cache}, {r.elapsed_s:.2f}s)")
    for cap in sorted(r.caps, key=lambda c: -c.support)[:50]:
        print(f"  support={cap.support:4d}  attrs={','.join(cap.attributes):40s} "
              f"sensors={','.join(cap.sensors)}")
    spark.stop()


if __name__ == "__main__":
    main()
