"""Synthetic generators for the paper's four demo datasets (§4).

The real feeds (SmartSantander, Chinese national air-quality network,
Shanghai/Guangzhou COVID-period monitors) are not available offline, so
each generator plants the *structure* the case studies rely on
(DESIGN.md §2, substitution S3):

* **Santander** — spatial clusters of mixed-attribute sensors sharing a
  latent city-activity signal with occasional jump events, so CAPs such
  as {temperature, traffic} and {light, temperature} exist by
  construction, plus unclustered background sensors as true negatives.
* **China6 / China13** — a lat/lon grid of monitoring stations where
  each *latitude band* shares a latent pollution signal (westerly wind
  advects pollution east–west), so east–west neighbors co-evolve and
  north–south neighbors do not — the §4 wind-direction claim.
* **COVID-19** — 12 sensors (2 cities × 6 pollutants) with a regime
  change at a lockdown tick: afterwards, levels drop and the coupling
  between traffic-driven pollutants weakens, shifting the CAP set
  (§4 / Figure 4 claim).

All generators are deterministic in ``seed`` and sized by ``scale``
(1.0 ≈ the paper's record counts; tests use ~0.01, benches ~0.1).
Latent signals are random walks with Bernoulli jump events; a sensor's
series is ``coupling · latent + (1 − coupling) · private walk``, so
jump ticks become shared evolving timestamps after normalization.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from repro.core.geo import meters_to_lat_degrees, meters_to_lon_degrees
from repro.smartcity.schema import LOCATIONS_SCHEMA, READINGS_SCHEMA


@dataclass
class SmartCityData:
    """One generated dataset: the two internal relations plus the
    metadata the store/API layers need (paper-format export, stats)."""

    name: str
    readings: DataFrame
    locations: DataFrame
    attributes: list[str]
    start: str
    interval_minutes: int
    n_sensors: int
    n_ticks: int
    meta: dict = field(default_factory=dict)

    @property
    def n_records(self) -> int:
        return self.n_sensors * self.n_ticks


def _walk(
    g: np.random.Generator,
    n_ticks: int,
    step: float = 0.02,
    jump_prob: float = 0.0,
    jump_scale: float = 0.45,
    jumps_at: np.ndarray | None = None,
) -> np.ndarray:
    """Random walk with optional Bernoulli jump events.

    ``jumps_at`` (bool mask) forces jump ticks — used so every sensor
    coupled to one latent signal jumps at the *same* ticks.
    """
    steps = g.normal(0.0, step, n_ticks)
    if jumps_at is None and jump_prob > 0:
        jumps_at = g.random(n_ticks) < jump_prob
    if jumps_at is not None:
        signs = g.choice([-1.0, 1.0], n_ticks)
        steps = steps + jumps_at * signs * (jump_scale + g.random(n_ticks) * jump_scale)
    return np.cumsum(steps)


def _series(
    g: np.random.Generator,
    latent: np.ndarray,
    coupling: float,
    base: float,
    amplitude: float,
    null_frac: float,
) -> np.ndarray:
    private = _walk(g, len(latent))
    v = base + amplitude * (coupling * latent + (1.0 - coupling) * private)
    if null_frac > 0:
        v = v.copy()
        v[g.random(len(v)) < null_frac] = np.nan
    return v


def _assemble(
    spark: SparkSession,
    name: str,
    sensor_rows: list[dict],
    series: dict[str, np.ndarray],
    attributes: list[str],
    start: str,
    interval_minutes: int,
    meta: dict,
) -> SmartCityData:
    loc_pdf = pd.DataFrame(sensor_rows, columns=["sensor_id", "attribute", "lat", "lon"])
    n_ticks = len(next(iter(series.values())))
    ids = np.repeat(loc_pdf["sensor_id"].to_numpy(), n_ticks)
    ticks = np.tile(np.arange(n_ticks, dtype="int64"), len(loc_pdf))
    values = np.concatenate([series[s] for s in loc_pdf["sensor_id"]])
    readings_pdf = pd.DataFrame({"sensor_id": ids, "t": ticks, "value": values})
    return SmartCityData(
        name=name,
        readings=spark.createDataFrame(readings_pdf, schema=READINGS_SCHEMA),
        locations=spark.createDataFrame(loc_pdf, schema=LOCATIONS_SCHEMA),
        attributes=attributes,
        start=start,
        interval_minutes=interval_minutes,
        n_sensors=len(loc_pdf),
        n_ticks=n_ticks,
        meta=meta,
    )


def santander(
    spark: SparkSession, *, scale: float = 0.1, seed: int = 7, null_frac: float = 0.01
) -> SmartCityData:
    """Santander (§4: 552 sensors, 2016-03-01..09-30 hourly, 2,329,936
    records; temperature, light, sound, traffic volume, humidity).

    At scale=1.0: 552 sensors × 4222 ticks ≈ 2.33 M records. 70% of the
    sensors sit in mixed-attribute clusters (~250 m radius) coupled to a
    per-cluster latent signal; 30% are unclustered background.
    """
    attributes = ["temperature", "light", "sound", "traffic", "humidity"]
    n_sensors = max(12, int(552 * min(1.0, scale * 2)))
    # floor of 240 ticks keeps ~19 latent jump events (rate 0.08) so
    # planted patterns clear ψ≈16 even at unit-test scales
    n_ticks = max(240, int(2_329_936 / 552 * scale))
    g = np.random.default_rng(seed)
    center_lat, center_lon = 43.462, -3.810
    n_clusters = max(2, n_sensors // 12)
    span_deg = meters_to_lat_degrees(4000.0)
    radius_deg = meters_to_lat_degrees(250.0)

    sensor_rows: list[dict] = []
    series: dict[str, np.ndarray] = {}
    n_clustered = int(n_sensors * 0.7)
    cluster_latents = [
        _walk(g, n_ticks, jump_prob=0.08) for _ in range(n_clusters)
    ]
    cluster_centers = [
        (center_lat + g.uniform(-span_deg, span_deg), center_lon + g.uniform(-span_deg, span_deg))
        for _ in range(n_clusters)
    ]
    for i in range(n_sensors):
        sid = f"sa{i:05d}"
        if i < n_clustered:
            c = i % n_clusters
            lat = cluster_centers[c][0] + g.uniform(-radius_deg, radius_deg)
            lon = cluster_centers[c][1] + g.uniform(-radius_deg, radius_deg)
            attr = attributes[i % len(attributes)]
            coupling = 0.85
            latent = cluster_latents[c]
        else:
            lat = center_lat + g.uniform(-span_deg * 1.5, span_deg * 1.5)
            lon = center_lon + g.uniform(-span_deg * 1.5, span_deg * 1.5)
            attr = attributes[int(g.integers(len(attributes)))]
            coupling = 0.0
            latent = _walk(g, n_ticks, jump_prob=0.08)
        base, amp = {"temperature": (15, 8), "light": (300, 200), "sound": (50, 15),
                     "traffic": (120, 80), "humidity": (70, 15)}[attr]
        sensor_rows.append({"sensor_id": sid, "attribute": attr, "lat": lat, "lon": lon})
        series[sid] = _series(g, latent, coupling, base, amp, null_frac)
    return _assemble(
        spark, "santander", sensor_rows, series, attributes,
        "2016-03-01 00:00:00", 60,
        {"paper_sensors": 552, "paper_records": 2_329_936, "n_clusters": n_clusters,
         "n_clustered": n_clustered, "scale": scale},
    )


def _china(
    spark: SparkSession,
    name: str,
    attributes: list[str],
    paper_sensors: int,
    paper_records: int,
    scale: float,
    seed: int,
    null_frac: float,
) -> SmartCityData:
    """Grid of stations; each latitude band shares a latent signal
    (westerly advection), adjacent bands are independent. Station
    spacing ~60 km; rows of the same band are η-neighbors east–west."""
    g = np.random.default_rng(seed)
    n_sensors = max(24, int(paper_sensors * min(1.0, scale)))
    n_ticks = max(240, int(paper_records / paper_sensors * scale * 4))
    n_stations = max(4, n_sensors // len(attributes))
    n_rows = max(2, int(np.sqrt(n_stations / 2)))
    n_cols = max(2, n_stations // n_rows)
    base_lat, base_lon = 32.0, 110.0
    dlat = meters_to_lat_degrees(60_000.0)
    dlon = meters_to_lon_degrees(60_000.0, at_latitude=base_lat)

    row_latents = [_walk(g, n_ticks, jump_prob=0.06) for _ in range(n_rows)]
    levels = {"PM2.5": (55, 40), "PM10": (90, 50), "SO2": (18, 10), "NO2": (35, 20),
              "CO": (0.9, 0.5), "O3": (60, 30), "temperature": (16, 12),
              "humidity": (60, 20), "pressure": (1013, 12), "daylight": (400, 300),
              "rain_pct": (20, 20), "rain_vol": (2, 3), "wind_speed": (3, 2)}
    sensor_rows: list[dict] = []
    series: dict[str, np.ndarray] = {}
    i = 0
    for r in range(n_rows):
        for c in range(n_cols):
            lat = base_lat + r * dlat + g.uniform(-dlat, dlat) * 0.05
            lon = base_lon + c * dlon + g.uniform(-dlon, dlon) * 0.05
            for attr in attributes:
                if i >= n_sensors:
                    break
                sid = f"cn{i:05d}"
                base, amp = levels.get(attr, (10, 5))
                sensor_rows.append({"sensor_id": sid, "attribute": attr, "lat": lat, "lon": lon})
                series[sid] = _series(g, row_latents[r], 0.85, base, amp, null_frac)
                i += 1
    return _assemble(
        spark, name, sensor_rows, series, attributes,
        "2016-09-01 00:00:00", 60,
        {"paper_sensors": paper_sensors, "paper_records": paper_records,
         "n_rows": n_rows, "n_cols": n_cols, "row_spacing_m": 60_000.0, "scale": scale},
    )


def china6(spark: SparkSession, *, scale: float = 0.01, seed: int = 11, null_frac: float = 0.01) -> SmartCityData:
    """China6 (§4: 9,438 sensors, 2016-09-01..2018-10-31, 6,889,740
    records; PM2.5, SO2, NO2, CO, O3 — plus PM10 to reach the 6
    pollutants the dataset name implies)."""
    return _china(
        spark, "china6", ["PM2.5", "PM10", "SO2", "NO2", "CO", "O3"],
        9_438, 6_889_740, scale, seed, null_frac,
    )


def china13(spark: SparkSession, *, scale: float = 0.01, seed: int = 13, null_frac: float = 0.01) -> SmartCityData:
    """China13 (§4: 4,810 sensors, same period, 3,511,300 records;
    pollutants plus weather attributes — 13 total)."""
    return _china(
        spark, "china13",
        ["PM2.5", "PM10", "SO2", "NO2", "CO", "O3", "temperature", "humidity",
         "pressure", "daylight", "rain_pct", "rain_vol", "wind_speed"],
        4_810, 3_511_300, scale, seed, null_frac,
    )


def covid19(
    spark: SparkSession, *, scale: float = 0.25, seed: int = 17, null_frac: float = 0.005
) -> SmartCityData:
    """COVID-19 (§4: 12 sensors in Shanghai & Guangzhou, 2020-01-01..
    06-30 hourly, 52,261 records; PM2.5, PM10, SO2, NO2, CO, O3).

    The lockdown tick sits at 50% of the horizon (equal-length periods
    so before/after absolute supports are comparable; the real lockdown
    was ~3 weeks in, which only shortens the "before" slice). Before it,
    the five traffic-driven pollutants of each city couple strongly
    (0.9) to a shared activity signal at full amplitude; after it,
    amplitude halves and coupling drops to 0.1 (pollution becomes
    meteorology-driven, not traffic-driven), so both levels *and*
    correlation patterns change — O3 keeps its own (photochemical)
    signal throughout. ``meta['lockdown_tick']`` marks the split used
    by the Table 6 harness.
    """
    attributes = ["PM2.5", "PM10", "SO2", "NO2", "CO", "O3"]
    n_ticks = max(200, int(52_261 / 12 * scale))
    lockdown = int(n_ticks * 0.5)
    g = np.random.default_rng(seed)
    cities = {"shanghai": (31.23, 121.47), "guangzhou": (23.13, 113.26)}
    levels = {"PM2.5": (60, 35), "PM10": (95, 45), "SO2": (15, 8), "NO2": (45, 25),
              "CO": (1.0, 0.5), "O3": (55, 30)}
    sensor_rows: list[dict] = []
    series: dict[str, np.ndarray] = {}
    ticks = np.arange(n_ticks)
    i = 0
    for city, (clat, clon) in cities.items():
        # the shared traffic-activity *events* all but stop at lockdown
        # (rate 0.08 → 0.01); the photochemical O3 signal is unaffected
        activity_jumps = np.where(
            ticks < lockdown, g.random(n_ticks) < 0.08, g.random(n_ticks) < 0.01
        )
        activity = _walk(g, n_ticks, jumps_at=activity_jumps)
        ozone = _walk(g, n_ticks, jump_prob=0.08)
        post = np.arange(n_ticks) >= lockdown
        for attr in attributes:
            sid = f"cv{i:05d}"
            jitter = meters_to_lat_degrees(500.0)
            lat = clat + g.uniform(-jitter, jitter)
            lon = clon + g.uniform(-jitter, jitter)
            base, amp = levels[attr]
            latent = ozone if attr == "O3" else activity
            coupling_pre, coupling_post = (0.9, 0.9) if attr == "O3" else (0.9, 0.1)
            private = _walk(g, n_ticks)
            mixed = np.where(
                post,
                coupling_post * latent + (1 - coupling_post) * private,
                coupling_pre * latent + (1 - coupling_pre) * private,
            )
            level_scale = np.where(post, 0.5 if attr != "O3" else 1.0, 1.0)
            v = (base + amp * mixed) * level_scale
            v[g.random(n_ticks) < null_frac] = np.nan
            sensor_rows.append({"sensor_id": sid, "attribute": attr, "lat": lat, "lon": lon})
            series[sid] = v
            i += 1
    return _assemble(
        spark, "covid19", sensor_rows, series, attributes,
        "2020-01-01 00:00:00", 60,
        {"paper_sensors": 12, "paper_records": 52_261, "lockdown_tick": lockdown,
         "cities": list(cities), "scale": scale},
    )
