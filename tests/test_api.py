"""Tests for the API facade: the demo's interactive loop — upload,
mine (cache-aware), click-to-highlight, and the Figure-3 payloads."""
import dataclasses

import pytest

from repro.core.types import MiscelaParams
from repro.server import MiscelaApi
from repro.smartcity.schema import write_csv_bundle
from tests.helpers import scene_locations_pdf, scene_readings_pdf, SCENE_SENSORS

PARAMS = MiscelaParams(epsilon=0.1, eta_meters=500.0, mu=3, psi=3,
                       segment_tolerance=0.0, max_sensors=5)


@pytest.fixture(scope="module")
def api(spark, tmp_path_factory):
    root = tmp_path_factory.mktemp("apiroot")
    bundle = tmp_path_factory.mktemp("scene_bundle")
    attributes = sorted({a for _, a, _, _, _, _ in SCENE_SENSORS})
    write_csv_bundle(
        bundle, scene_readings_pdf(), scene_locations_pdf(), attributes,
        "2016-03-01 00:00:00", 60,
    )
    api = MiscelaApi(spark, root)
    api.upload("scene", bundle, chunk_lines=50)
    return api


class TestUploadEndpoint:
    def test_dataset_registered(self, api):
        assert api.datasets() == ["scene"]

    def test_reupload_overwrites(self, api, spark, tmp_path_factory):
        assert api.store.exists("scene")


class TestMineEndpoint:
    def test_first_call_misses_cache(self, api):
        r = api.mine("scene", PARAMS)
        assert r.from_cache is False
        assert r.n_caps == 5  # the scene's planted CAPs (see test_miscela)

    def test_second_call_hits_cache_same_results(self, api):
        r1 = api.mine("scene", PARAMS)
        r2 = api.mine("scene", PARAMS)
        assert r2.from_cache is True
        assert set(r2.caps) == set(r1.caps)

    def test_changed_params_miss_cache(self, api):
        r = api.mine("scene", dataclasses.replace(PARAMS, psi=4))
        assert r.from_cache is False
        assert r.n_caps == 4  # cluster B (support 3) drops out

    def test_cached_call_is_not_slower_class_of_work(self, api):
        api.mine("scene", PARAMS)
        r = api.mine("scene", PARAMS)
        assert r.from_cache and r.elapsed_s < 1.0

    def test_unknown_dataset_raises(self, api):
        with pytest.raises(KeyError):
            api.mine("ghost", PARAMS)


class TestCorrelatedSensors:
    def test_click_a1_highlights_cluster(self, api):
        got = api.correlated_sensors("scene", PARAMS, "a1")
        assert set(got) == {"a2", "a3"}
        assert got["a2"] == ["light", "temperature", "traffic"]

    def test_click_b1(self, api):
        got = api.correlated_sensors("scene", PARAMS, "b1")
        assert set(got) == {"b2"}
        assert got["b2"] == ["temperature", "traffic"]

    def test_click_isolated_sensor_empty(self, api):
        assert api.correlated_sensors("scene", PARAMS, "c1") == {}


class TestMapPayload:
    def test_markers_cover_all_sensors(self, api):
        p = api.map_payload("scene", PARAMS)
        assert [m["sensor_id"] for m in p["markers"]] == ["a1", "a2", "a3", "b1", "b2", "c1"]
        assert p["n_highlighted"] == 0

    def test_click_highlights_clicked_and_correlated(self, api):
        p = api.map_payload("scene", PARAMS, clicked="a1")
        hl = {m["sensor_id"] for m in p["markers"] if m["highlighted"]}
        assert hl == {"a1", "a2", "a3"}
        assert p["n_highlighted"] == 3

    def test_markers_carry_cap_membership(self, api):
        p = api.map_payload("scene", PARAMS)
        by_id = {m["sensor_id"]: m for m in p["markers"]}
        assert len(by_id["a1"]["caps"]) == 3  # {a1,a2},{a1,a3},{a1,a2,a3}
        assert by_id["c1"]["caps"] == []
        for i in by_id["a1"]["caps"]:
            assert "a1" in p["caps"][i]["sensors"]


class TestTimeseriesPayload:
    def test_full_series(self, api):
        p = api.timeseries_payload("scene", ["a1", "b1"])
        assert set(p["series"]) == {"a1", "b1"}
        assert len(p["series"]["a1"]) == 30
        assert p["interval_minutes"] == 60

    def test_zoom_window_clips(self, api):
        p = api.timeseries_payload("scene", ["a1"], t_min=5, t_max=10)
        ts = [pt["t"] for pt in p["series"]["a1"]]
        assert ts == list(range(5, 11))

    def test_requesting_unknown_sensor_gives_empty_series(self, api):
        p = api.timeseries_payload("scene", ["nope"])
        assert p["series"]["nope"] == []
