"""Unit tests for step 3b (connected components by label propagation)
against a union-find reference."""
import numpy as np
import pandas as pd
import pytest

from repro.core.components import connected_components
from tests.helpers import ref_components


def _run(spark, sensors, edges, **kw):
    sdf = spark.createDataFrame(pd.DataFrame({"sensor_id": sensors}), "sensor_id string")
    edf = spark.createDataFrame(
        pd.DataFrame(list(edges) or [], columns=["src", "dst"]), "src string, dst string"
    )
    out = connected_components(sdf, edf, **kw)
    return {r["sensor_id"]: r["component"] for r in out.collect()}


class TestConnectedComponents:
    def test_two_triangles(self, spark):
        edges = {("a", "b"), ("b", "c"), ("x", "y"), ("y", "z")}
        got = _run(spark, list("abcxyz"), edges)
        assert got == {"a": "a", "b": "a", "c": "a", "x": "x", "y": "x", "z": "x"}

    def test_isolated_sensors_are_singletons(self, spark):
        got = _run(spark, ["a", "b", "lone"], {("a", "b")})
        assert got["lone"] == "lone" and got["a"] == got["b"] == "a"

    def test_long_chain(self, spark):
        # diameter > 1 forces several propagation rounds
        sensors = [f"n{i:02d}" for i in range(12)]
        edges = {(sensors[i], sensors[i + 1]) for i in range(11)}
        got = _run(spark, sensors, edges)
        assert set(got.values()) == {"n00"}

    def test_no_edges(self, spark):
        got = _run(spark, ["a", "b", "c"], set())
        assert got == {"a": "a", "b": "b", "c": "c"}

    def test_empty_graph(self, spark):
        assert _run(spark, [], set()) == {}

    @pytest.mark.parametrize("seed", [0, 1, 2])
    def test_random_graphs_match_union_find(self, spark, seed):
        g = np.random.default_rng(seed)
        sensors = [f"s{i:02d}" for i in range(25)]
        edges = set()
        for i in range(25):
            for j in range(i + 1, 25):
                if g.random() < 0.06:
                    edges.add((sensors[i], sensors[j]))
        got = _run(spark, sensors, edges)
        assert got == ref_components(sensors, edges)

    def test_component_label_is_min_member(self, spark):
        got = _run(spark, ["z", "m", "a"], {("z", "m"), ("m", "a")})
        assert set(got.values()) == {"a"}

    def test_raises_when_iteration_cap_too_low(self, spark):
        sensors = [f"n{i:02d}" for i in range(10)]
        edges = {(sensors[i], sensors[i + 1]) for i in range(9)}
        with pytest.raises(RuntimeError, match="did not converge"):
            _run(spark, sensors, edges, max_iterations=1)
