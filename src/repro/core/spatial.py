"""Step 3a of MISCELA: the η-neighbor graph (paper §2.1 "distance
threshold η").

Two sensors are neighbors iff their haversine distance is below η.
Rather than an O(n²) cross join, sensors are bucketed into grid cells of
side ≥ η (in degrees, longitude width taken at the latitude closest to
the equator so cells never shrink below η) and each sensor is joined
against its 3×3 cell neighborhood, then filtered by exact haversine —
the standard spatial-band-join idiom for Catalyst.
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.core.geo import haversine_col, meters_to_lat_degrees, meters_to_lon_degrees

LOCATION_COLUMNS = ("sensor_id", "attribute", "lat", "lon")


def neighbor_edges(locations: DataFrame, eta_meters: float) -> DataFrame:
    """Undirected η-neighbor edges ``(src, dst, dist_m)`` with src < dst.

    Parameters
    ----------
    locations:
        ``(sensor_id string, attribute string, lat double, lon double)``
        — one row per sensor (the paper treats co-located sensors with
        different attributes as *different* sensors, §4 footnote 2; a
        zero distance between them is therefore a valid edge).
    eta_meters:
        Distance threshold η; strict ``dist < η``.
    """
    # Cell sizes from the latitude band of the data: use the latitude
    # nearest the equator so a lon-cell is never narrower than η there.
    row = locations.agg(
        F.min(F.abs("lat")).alias("min_abs_lat"), F.count("*").alias("n")
    ).first()
    if row is None or row["n"] == 0:
        return locations.sparkSession.createDataFrame(
            [], "src string, dst string, dist_m double"
        )
    lat_cell = meters_to_lat_degrees(eta_meters)
    lon_cell = meters_to_lon_degrees(eta_meters, at_latitude=float(row["min_abs_lat"]))

    cells = locations.select(
        F.col("sensor_id"),
        F.col("lat"),
        F.col("lon"),
        F.floor(F.col("lat") / F.lit(lat_cell)).alias("cx"),
        F.floor(F.col("lon") / F.lit(lon_cell)).alias("cy"),
    )
    # Explode left side into its 3×3 cell neighborhood; equi-join on the
    # cell key so Catalyst plans a shuffle hash/sort-merge join, not a
    # cartesian product.
    offsets = [(dx, dy) for dx in (-1, 0, 1) for dy in (-1, 0, 1)]
    probe = cells.select(
        F.col("sensor_id").alias("src"),
        F.col("lat").alias("src_lat"),
        F.col("lon").alias("src_lon"),
        F.explode(
            F.array(
                *[
                    F.struct(
                        (F.col("cx") + F.lit(dx)).alias("cx"),
                        (F.col("cy") + F.lit(dy)).alias("cy"),
                    )
                    for dx, dy in offsets
                ]
            )
        ).alias("cell"),
    ).select("src", "src_lat", "src_lon", F.col("cell.cx").alias("cx"), F.col("cell.cy").alias("cy"))

    build = cells.select(
        F.col("sensor_id").alias("dst"),
        F.col("lat").alias("dst_lat"),
        F.col("lon").alias("dst_lon"),
        "cx",
        "cy",
    )
    return (
        probe.join(build, on=["cx", "cy"])
        .where(F.col("src") < F.col("dst"))
        .withColumn(
            "dist_m",
            haversine_col(
                F.col("src_lat"), F.col("src_lon"), F.col("dst_lat"), F.col("dst_lon")
            ),
        )
        .where(F.col("dist_m") < F.lit(float(eta_meters)))
        .select("src", "dst", "dist_m")
        .dropDuplicates(["src", "dst"])
    )
