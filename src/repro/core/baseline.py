"""Baseline CAP miner for the efficiency comparison (Table 4).

The paper (§2.2) positions MISCELA as "an efficient algorithm for CAP
mining"; its efficiency comes from (a) restricting the search to
spatially connected sets and (b) anti-monotone support pruning while
expanding the search tree. The natural comparator is the same
enumeration with pruning disabled: the search expands the full
connected-subset lattice (bounded only by μ and the ``max_sensors``
safety bound) and evaluates support only when a candidate is emitted.

Both miners share steps 1–3 and the enumeration kernel, so the
comparison isolates exactly the pruning — and they must return the
identical CAP set, which the tests assert.
"""
from __future__ import annotations

from pyspark.sql import DataFrame, SparkSession

from repro.core.miscela import mine_caps_local
from repro.core.types import CAP, MiscelaParams, SearchStats


def mine_caps_baseline(
    spark: SparkSession,
    readings: DataFrame,
    locations: DataFrame,
    params: MiscelaParams,
    naive_spatial: bool = False,
) -> tuple[list[CAP], SearchStats, dict]:
    """Unpruned CAP mining.

    ``naive_spatial=True`` additionally drops the co-evolving-edge
    restriction, searching the raw η-neighbor graph (the fully naive
    miner); CAP output is identical either way.
    """
    return mine_caps_local(
        spark,
        readings,
        locations,
        params,
        prune_support=False,
        eta_adjacency_for_baseline=naive_spatial,
    )
