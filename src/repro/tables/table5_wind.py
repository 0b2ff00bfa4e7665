"""Table 5 — the China wind-direction case study (paper §4).

"sensors are not correlated if two sensors are vertically (north and
south) close to each other, but if sensors are horizontally (east and
west) close, they are correlated. These are often caused by wind
directions."

On the China grid (each latitude band shares an advected pollution
signal), we take every η-neighbor pair, classify it as east–west
(|Δlat| small relative to |Δlon|) or north–south (the converse), and
report per class: pair count, mean co-evolution support, and the
fraction of pairs that are co-evolving at ψ. The shape to match:
E–W pairs far exceed N–S pairs in support and co-evolving fraction.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import SparkSession
from pyspark.sql import functions as F

from repro.core.coevolution import pair_supports
from repro.core.evolving import extract_evolving
from repro.core.segmentation import smooth_readings
from repro.core.spatial import neighbor_edges
from repro.core.types import MiscelaParams
from repro.smartcity import china6

PARAMS = MiscelaParams(
    epsilon=0.05, eta_meters=70_000.0, mu=3, psi=8, segment_tolerance=0.02
)


def run(
    spark: SparkSession,
    scale: float = 0.004,
    seed: int = 11,
    params: MiscelaParams = PARAMS,
) -> pd.DataFrame:
    d = china6(spark, scale=scale, seed=seed)
    smoothed = smooth_readings(d.readings, params.segment_tolerance)
    evolving = extract_evolving(smoothed, params.epsilon).cache()
    edges = neighbor_edges(d.locations, params.eta_meters)

    # orientation from the location deltas; 3x factor separates grid
    # rows (Δlat ≈ 0) from grid columns (Δlon ≈ 0); co-located
    # same-station pairs (different attributes) are their own class
    loc = d.locations.select("sensor_id", "lat", "lon")
    e = (
        edges.join(loc.toDF("src", "src_lat", "src_lon"), on="src")
        .join(loc.toDF("dst", "dst_lat", "dst_lon"), on="dst")
        .withColumn("dlat", F.abs(F.col("src_lat") - F.col("dst_lat")))
        .withColumn("dlon", F.abs(F.col("src_lon") - F.col("dst_lon")))
        .withColumn(
            "orientation",
            F.when((F.col("dlat") < 1e-9) & (F.col("dlon") < 1e-9), "same_station")
            .when(F.col("dlon") > 3 * F.col("dlat"), "east_west")
            .when(F.col("dlat") > 3 * F.col("dlon"), "north_south")
            .otherwise("diagonal"),
        )
    )
    sup = pair_supports(evolving, edges)
    merged = e.join(sup, on=["src", "dst"], how="left").fillna({"support": 0})
    out = (
        merged.groupBy("orientation")
        .agg(
            F.count("*").alias("n_pairs"),
            F.round(F.avg("support"), 2).alias("mean_support"),
            F.round(
                F.avg((F.col("support") >= params.psi).cast("double")), 3
            ).alias("coevolving_frac"),
        )
        .orderBy("orientation")
        .toPandas()
    )
    evolving.unpersist()
    return out
