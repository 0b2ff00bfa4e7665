"""Integration tests: the full 4-step pipeline, distributed vs local vs
baseline agreement, and the planted-pattern ground truth of the scene."""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.core.baseline import mine_caps_baseline
from repro.core.miscela import (
    CAPS_SCHEMA,
    caps_to_rows,
    mine_caps,
    mine_caps_local,
    rows_to_caps,
)
from repro.core.types import CAP, MiscelaParams
from repro.oracle import assert_equivalent
from tests.helpers import scene_spark

PARAMS = MiscelaParams(epsilon=0.1, eta_meters=500.0, mu=3, psi=3,
                       segment_tolerance=0.0, max_sensors=5)


@pytest.fixture(scope="module")
def scene_mined(spark):
    readings, locations = scene_spark(spark)
    return mine_caps(spark, readings, locations, PARAMS)


def _cap_set(caps):
    return {(c.sensors, c.attributes, c.support) for c in caps}


class TestDistributedPipeline:
    def test_finds_exactly_the_planted_caps(self, spark, scene_mined):
        got = _cap_set(rows_to_caps(scene_mined.caps.collect()))
        # cluster A: three sensors, three attributes, all jump at the
        # same 4 ticks; every connected ≥2-attribute subset qualifies.
        # cluster B co-evolves only 3 ticks with ψ=3 → included.
        assert got == {
            (("a1", "a2"), ("temperature", "traffic"), 4),
            (("a1", "a3"), ("light", "temperature"), 4),
            (("a2", "a3"), ("light", "traffic"), 4),
            (("a1", "a2", "a3"), ("light", "temperature", "traffic"), 4),
            (("b1", "b2"), ("temperature", "traffic"), 3),
        }

    def test_psi_four_drops_cluster_b(self, spark):
        readings, locations = scene_spark(spark)
        import dataclasses

        art = mine_caps(spark, readings, locations, dataclasses.replace(PARAMS, psi=4))
        got = {tuple(r["sensors"].split(",")) for r in art.caps.collect()}
        assert ("b1", "b2") not in got and ("a1", "a2") in got

    def test_caps_schema(self, spark, scene_mined):
        assert scene_mined.caps.schema.simpleString() == (
            "struct<component:string,sensors:string,attributes:string,support:bigint,size:bigint>"
        )

    def test_component_labels_consistent(self, spark, scene_mined):
        rows = scene_mined.caps.collect()
        for r in rows:
            assert r["component"] in ("a1", "b1")
            assert r["sensors"].split(",")[0].startswith(r["component"][0])

    def test_size_column_matches_sensor_count(self, spark, scene_mined):
        for r in scene_mined.caps.collect():
            assert r["size"] == len(r["sensors"].split(","))

    def test_artifacts_expose_intermediates(self, spark, scene_mined):
        # a1,a2,a3 → 4 each = 12; b1,b2 → 3 each = 6; c1 → 1 ⇒ 19 rows
        assert scene_mined.evolving.count() == 19
        assert scene_mined.edges.count() == 4  # A triangle + B pair
        assert set(scene_mined.timings) >= {"segment_and_extract_s", "spatial_join_s", "search_s"}

    def test_oracle_cap_count_by_size(self, spark, scene_mined):
        got = scene_mined.caps.groupBy("size").agg(F.count("*").alias("n"))
        assert_equivalent(
            got,
            "SELECT size, count(*) AS n FROM caps GROUP BY size",
            caps=scene_mined.caps,
        )


class TestLocalAndBaselineAgree:
    def test_local_matches_distributed(self, spark, scene_mined):
        readings, locations = scene_spark(spark)
        local, stats, _ = mine_caps_local(spark, readings, locations, PARAMS)
        assert _cap_set(local) == _cap_set(rows_to_caps(scene_mined.caps.collect()))
        assert stats.emitted == len(local)

    def test_baseline_matches_miscela(self, spark, scene_mined):
        readings, locations = scene_spark(spark)
        base, _, _ = mine_caps_baseline(spark, readings, locations, PARAMS)
        assert _cap_set(base) == _cap_set(rows_to_caps(scene_mined.caps.collect()))

    def test_naive_spatial_baseline_matches_too(self, spark, scene_mined):
        readings, locations = scene_spark(spark)
        base, _, _ = mine_caps_baseline(spark, readings, locations, PARAMS, naive_spatial=True)
        assert _cap_set(base) == _cap_set(rows_to_caps(scene_mined.caps.collect()))

    def test_miscela_never_does_more_support_work(self, spark):
        readings, locations = scene_spark(spark)
        _, s_fast, _ = mine_caps_local(spark, readings, locations, PARAMS)
        _, s_slow, _ = mine_caps_baseline(spark, readings, locations, PARAMS, naive_spatial=True)
        assert s_fast.nodes_expanded <= s_slow.nodes_expanded


class TestRowConversion:
    def test_roundtrip(self):
        caps = [CAP(("b", "a"), ("y", "x"), 5, component="a"),
                CAP(("c", "d"), ("x", "z"), 2, component="c")]
        rows = caps_to_rows(caps)
        assert rows_to_caps(rows) == [
            CAP(("a", "b"), ("x", "y"), 5, "a"), CAP(("c", "d"), ("x", "z"), 2, "c")
        ]

    def test_rows_are_scalar_only(self):
        rows = caps_to_rows([CAP(("a", "b"), ("x", "y"), 5, "a")])
        assert rows[0] == {
            "component": "a", "sensors": "a,b", "attributes": "x,y",
            "support": 5, "size": 2,
        }


class TestEmptyInputs:
    def test_no_evolving_sensors_yields_no_caps(self, spark):
        # constant series → normalization zeros → nothing evolves
        pdf = pd.DataFrame(
            {"sensor_id": ["k"] * 5 + ["l"] * 5, "t": list(range(5)) * 2, "value": 1.0}
        )
        loc = pd.DataFrame(
            {"sensor_id": ["k", "l"], "attribute": ["x", "y"],
             "lat": [0.0, 0.0], "lon": [0.0, 0.0001]}
        )
        art = mine_caps(
            spark,
            spark.createDataFrame(pdf, "sensor_id string, t long, value double"),
            spark.createDataFrame(loc, "sensor_id string, attribute string, lat double, lon double"),
            PARAMS,
        )
        assert art.caps.count() == 0
        assert art.caps.columns == ["component", "sensors", "attributes", "support", "size"]
