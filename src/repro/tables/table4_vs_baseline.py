"""Table 4 — MISCELA vs the unpruned baseline (paper §2.2).

"MISCELA supports efficient computation for CAP mining" via the
spatially restricted, anti-monotone-pruned tree search. We compare
three miners that provably return the same CAPs:

* **miscela** — co-evolving-edge graph + support pruning,
* **no-prune** — co-evolving-edge graph, no support pruning,
* **naive**   — raw η-graph, no support pruning (the fully naive
  search the MDM paper's baselines approximate).

Rows report search wall-time, nodes expanded and support evaluations
per ψ. The *shape* to match: miscela ≤ no-prune ≤ naive in work, with
the gap widening as ψ grows (more pruning opportunity).
"""
from __future__ import annotations

import dataclasses

import pandas as pd
from pyspark.sql import SparkSession

from repro.core.baseline import mine_caps_baseline
from repro.core.miscela import mine_caps_local
from repro.core.types import MiscelaParams
from repro.smartcity import santander

# η=2000 m (vs the 800 m of Tables 2/7) deliberately over-connects the
# spatial graph: background sensors join cluster components, so the
# naive η-lattice is much larger than the co-evolving-edge lattice and
# the pruning gap the table measures actually exists.
BASE = MiscelaParams(
    epsilon=0.05, eta_meters=2000.0, mu=3, psi=8, segment_tolerance=0.02, max_sensors=5
)


def run(
    spark: SparkSession,
    scale: float = 0.02,
    seed: int = 7,
    psis: tuple[int, ...] = (4, 8, 16),
) -> pd.DataFrame:
    d = santander(spark, scale=scale, seed=seed)
    readings = d.readings.cache()
    locations = d.locations.cache()
    rows = []
    for psi in psis:
        p = dataclasses.replace(BASE, psi=psi)
        fast, s_fast, t_fast = mine_caps_local(spark, readings, locations, p)
        slow, s_slow, t_slow = mine_caps_baseline(spark, readings, locations, p)
        naive, s_naive, t_naive = mine_caps_baseline(
            spark, readings, locations, p, naive_spatial=True
        )
        assert {(c.sensors, c.support) for c in fast} \
            == {(c.sensors, c.support) for c in slow} \
            == {(c.sensors, c.support) for c in naive}
        rows.append(
            {
                "psi": psi,
                "n_caps": len(fast),
                "miscela_search_s": round(t_fast["search_s"], 3),
                "noprune_search_s": round(t_slow["search_s"], 3),
                "naive_search_s": round(t_naive["search_s"], 3),
                "miscela_nodes": s_fast.nodes_expanded,
                "noprune_nodes": s_slow.nodes_expanded,
                "naive_nodes": s_naive.nodes_expanded,
                "speedup_vs_naive": round(
                    t_naive["search_s"] / max(t_fast["search_s"], 1e-9), 1
                ),
            }
        )
    readings.unpersist()
    locations.unpersist()
    return pd.DataFrame(rows)
