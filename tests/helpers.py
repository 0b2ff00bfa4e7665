"""Shared test fixtures: a hand-crafted smart-city scene with exactly
known evolving timestamps and CAPs, plus pandas/numpy reference
implementations used as oracles for the distributed stages.

The **two-cluster scene**: cluster A (three sensors, three attributes,
pairwise ≤ ~250 m apart) shares step-jumps at ticks {5, 10, 15, 20};
cluster B (two sensors, two attributes, ~10 km away) jumps at
{7, 14, 21}; a lone sensor C jumps at {3}. All series are piecewise
constant in [0, 1] with min 0 / max 1, so min-max normalization is the
identity and with ``segment_tolerance=0`` the evolving timestamps equal
the jump ticks exactly.
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from repro.core.geo import haversine_np

N_TICKS = 30
A_JUMPS = (5, 10, 15, 20)
B_JUMPS = (7, 14, 21)
C_JUMPS = (3,)


def step_series(jumps: tuple[int, ...], n_ticks: int = N_TICKS, sign: int = 1) -> np.ndarray:
    """Piecewise-constant series jumping by ±1/len(jumps) at each jump
    tick; min 0 and max 1 (after sign flip for decreasing series)."""
    v = np.zeros(n_ticks)
    for j in jumps:
        v[j:] += 1.0 / len(jumps)
    if sign < 0:
        v = 1.0 - v
    return v


SCENE_SENSORS = [
    # sensor_id, attribute, lat, lon, jumps, sign
    ("a1", "temperature", 43.4620, -3.8020, A_JUMPS, 1),
    ("a2", "traffic", 43.4635, -3.8020, A_JUMPS, 1),
    ("a3", "light", 43.4620, -3.7995, A_JUMPS, -1),
    ("b1", "temperature", 43.5500, -3.8020, B_JUMPS, 1),
    ("b2", "traffic", 43.5513, -3.8020, B_JUMPS, 1),
    ("c1", "humidity", 43.3000, -3.9500, C_JUMPS, 1),
]


def scene_locations_pdf() -> pd.DataFrame:
    return pd.DataFrame(
        [
            {"sensor_id": s, "attribute": a, "lat": lat, "lon": lon}
            for s, a, lat, lon, _, _ in SCENE_SENSORS
        ]
    )


def scene_readings_pdf() -> pd.DataFrame:
    frames = []
    for s, _, _, _, jumps, sign in SCENE_SENSORS:
        v = step_series(jumps, sign=sign)
        frames.append(pd.DataFrame({"sensor_id": s, "t": np.arange(N_TICKS), "value": v}))
    return pd.concat(frames, ignore_index=True)


def scene_spark(spark):
    """(readings, locations) Spark DataFrames of the scene."""
    return (
        spark.createDataFrame(scene_readings_pdf(), "sensor_id string, t long, value double"),
        spark.createDataFrame(scene_locations_pdf(), "sensor_id string, attribute string, lat double, lon double"),
    )


# ---- reference implementations (oracles) ----------------------------

def ref_neighbor_edges(locations_pdf: pd.DataFrame, eta_meters: float) -> set[tuple[str, str]]:
    """O(n²) haversine reference for the grid-cell spatial join."""
    out = set()
    rows = locations_pdf.to_dict("records")
    for i, r1 in enumerate(rows):
        for r2 in rows[i + 1 :]:
            d = haversine_np(
                np.array(r1["lat"]), np.array(r1["lon"]),
                np.array(r2["lat"]), np.array(r2["lon"]),
            )
            if d < eta_meters:
                a, b = sorted([r1["sensor_id"], r2["sensor_id"]])
                out.add((a, b))
    return out


def ref_components(sensors: list[str], edges: set[tuple[str, str]]) -> dict[str, str]:
    """Union-find reference for the label-propagation components."""
    parent = {s: s for s in sensors}

    def find(x):
        while parent[x] != x:
            parent[x] = parent[parent[x]]
            x = parent[x]
        return x

    for a, b in edges:
        ra, rb = find(a), find(b)
        if ra != rb:
            parent[max(ra, rb)] = min(ra, rb)
    return {s: find(s) for s in sensors}


def ref_evolving(readings_pdf: pd.DataFrame, tolerance: float, epsilon: float) -> pd.DataFrame:
    """Pandas reference of steps 1–2 (shares the numpy kernels, which
    are themselves unit-tested against hand-computed values)."""
    from repro.core.segmentation import normalize_series, segment_series

    rows = []
    for sid, grp in readings_pdf.groupby("sensor_id"):
        grp = grp.sort_values("t")
        sm = segment_series(normalize_series(grp["value"].to_numpy()), tolerance)
        d = np.diff(sm)
        ts = grp["t"].to_numpy()
        for i, dd in enumerate(d):
            if abs(dd) > epsilon:
                rows.append({"sensor_id": sid, "t": int(ts[i + 1]), "direction": 1 if dd > 0 else -1})
    return pd.DataFrame(rows, columns=["sensor_id", "t", "direction"])


def random_graph_instance(seed: int, n: int = 8, n_attrs: int = 3, n_ticks: int = 25,
                          edge_prob: float = 0.45, evolve_prob: float = 0.4):
    """Random (attributes, adjacency, epos, eneg) for search-kernel
    fuzzing against the brute-force oracle."""
    g = np.random.default_rng(seed)
    sensors = [f"s{i}" for i in range(n)]
    attributes = {s: f"attr{int(g.integers(n_attrs))}" for s in sensors}
    adjacency = {s: set() for s in sensors}
    for i in range(n):
        for j in range(i + 1, n):
            if g.random() < edge_prob:
                adjacency[sensors[i]].add(sensors[j])
                adjacency[sensors[j]].add(sensors[i])
    epos, eneg = {}, {}
    for s in sensors:
        mask = g.random(n_ticks) < evolve_prob
        ticks = np.nonzero(mask)[0]
        split = g.random(len(ticks)) < 0.5
        epos[s] = frozenset(int(t) for t in ticks[split])
        eneg[s] = frozenset(int(t) for t in ticks[~split])
    return attributes, adjacency, epos, eneg
