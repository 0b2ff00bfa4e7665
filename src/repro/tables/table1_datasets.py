"""Table 1 — dataset inventory (paper §4's dataset list).

For each of the four demo datasets: sensors, ticks, records, and
attribute count of our synthetic build at the given scale, next to the
paper's published sensor/record counts.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import SparkSession
from pyspark.sql import functions as F

from repro.smartcity import china6, china13, covid19, santander


def run(spark: SparkSession, scale: float = 0.02) -> pd.DataFrame:
    rows = []
    for gen, kw in (
        (santander, {"scale": scale}),
        (china6, {"scale": scale / 2}),
        (china13, {"scale": scale / 2}),
        (covid19, {"scale": max(scale * 5, 0.1)}),
    ):
        d = gen(spark, **kw)
        null_frac = (
            d.readings.agg(
                (F.count(F.when(F.col("value").isNull(), 1)) / F.count("*")).alias("f")
            ).first()["f"]
        )
        rows.append(
            {
                "dataset": d.name,
                "sensors": d.n_sensors,
                "ticks": d.n_ticks,
                "records": d.n_records,
                "attributes": len(d.attributes),
                "null_frac": round(float(null_frac), 4),
                "paper_sensors": d.meta["paper_sensors"],
                "paper_records": d.meta["paper_records"],
            }
        )
    return pd.DataFrame(rows)
