"""Tests for the synthetic smart-city datasets: shapes, determinism,
and — critically — that each generator plants the structure its §4 case
study needs (cluster co-evolution, wind rows, COVID regime change)."""
import numpy as np
import pytest
from pyspark.sql import functions as F

from repro.smartcity import china6, china13, covid19, santander


@pytest.fixture(scope="module")
def sant(spark):
    return santander(spark, scale=0.02, seed=1)


@pytest.fixture(scope="module")
def cov(spark):
    return covid19(spark, scale=0.1, seed=2)


class TestShapes:
    def test_santander_attributes(self, spark, sant):
        assert sant.attributes == ["temperature", "light", "sound", "traffic", "humidity"]
        got = {r["attribute"] for r in sant.locations.select("attribute").distinct().collect()}
        assert got <= set(sant.attributes)

    def test_santander_record_count(self, spark, sant):
        assert sant.readings.count() == sant.n_records == sant.n_sensors * sant.n_ticks

    def test_locations_one_row_per_sensor(self, spark, sant):
        assert sant.locations.count() == sant.n_sensors
        assert sant.locations.select("sensor_id").distinct().count() == sant.n_sensors

    def test_china6_attributes(self, spark):
        d = china6(spark, scale=0.003)
        assert len(d.attributes) == 6
        assert d.meta["paper_sensors"] == 9_438

    def test_china13_attributes(self, spark):
        d = china13(spark, scale=0.005)
        assert len(d.attributes) == 13
        assert d.meta["paper_records"] == 3_511_300

    def test_covid_is_twelve_sensors_two_cities(self, spark, cov):
        assert cov.n_sensors == 12
        assert len(cov.attributes) == 6
        lats = [r["lat"] for r in cov.locations.collect()]
        assert sum(1 for la in lats if la > 28) == 6  # Shanghai half
        assert sum(1 for la in lats if la < 28) == 6  # Guangzhou half

    def test_paper_scale_configs_recorded(self, spark, sant, cov):
        assert sant.meta["paper_sensors"] == 552
        assert sant.meta["paper_records"] == 2_329_936
        assert cov.meta["paper_records"] == 52_261

    def test_null_injection(self, spark, sant):
        n_null = sant.readings.where(F.col("value").isNull()).count()
        assert 0 < n_null < 0.05 * sant.n_records


class TestDeterminism:
    def test_same_seed_same_data(self, spark):
        a = covid19(spark, scale=0.05, seed=9)
        b = covid19(spark, scale=0.05, seed=9)
        pa = a.readings.toPandas().sort_values(["sensor_id", "t"]).reset_index(drop=True)
        pb = b.readings.toPandas().sort_values(["sensor_id", "t"]).reset_index(drop=True)
        assert pa.equals(pb)

    def test_different_seed_different_data(self, spark):
        a = covid19(spark, scale=0.05, seed=9).readings.toPandas()
        b = covid19(spark, scale=0.05, seed=10).readings.toPandas()
        assert not a["value"].equals(b["value"])


def _corr_of(df_pdf, s1, s2):
    a = df_pdf[df_pdf.sensor_id == s1].sort_values("t")["value"].to_numpy()
    b = df_pdf[df_pdf.sensor_id == s2].sort_values("t")["value"].to_numpy()
    mask = ~(np.isnan(a) | np.isnan(b))
    return float(np.corrcoef(np.diff(a[mask]), np.diff(b[mask]))[0, 1])


class TestPlantedStructure:
    def test_santander_cluster_sensors_coevolve_background_does_not(self, spark, sant):
        pdf = sant.readings.toPandas()
        loc = sant.locations.toPandas()
        n_clustered = sant.meta["n_clustered"]
        n_clusters = sant.meta["n_clusters"]
        # first two sensors of cluster 0 (indices 0 and n_clusters)
        s_a, s_b = "sa00000", f"sa{n_clusters:05d}"
        coupled = abs(_corr_of(pdf, s_a, s_b))
        bg_ids = [f"sa{i:05d}" for i in range(n_clustered, sant.n_sensors)]
        background = abs(_corr_of(pdf, bg_ids[0], s_a))
        assert coupled > 0.5
        assert background < 0.35

    def test_china_same_row_correlates_cross_row_does_not(self, spark):
        d = china6(spark, scale=0.004, seed=3)
        pdf = d.readings.toPandas()
        loc = d.locations.toPandas().sort_values("sensor_id")
        lat_of = dict(zip(loc.sensor_id, loc.lat))
        ids = list(loc.sensor_id)
        same_row = [(a, b) for a in ids for b in ids if a < b
                    and abs(lat_of[a] - lat_of[b]) < 0.1][:3]
        cross_row = [(a, b) for a in ids for b in ids if a < b
                     and abs(lat_of[a] - lat_of[b]) > 0.3][:3]
        assert same_row and cross_row
        for a, b in same_row:
            assert abs(_corr_of(pdf, a, b)) > 0.5
        for a, b in cross_row:
            assert abs(_corr_of(pdf, a, b)) < 0.35

    def test_covid_levels_drop_after_lockdown(self, spark, cov):
        lock = cov.meta["lockdown_tick"]
        pdf = cov.readings.toPandas()
        attr_of = dict(zip(*(c.tolist() for c in
                             (cov.locations.toPandas().sensor_id,
                              cov.locations.toPandas().attribute))))
        for sid, grp in pdf.groupby("sensor_id"):
            if attr_of[sid] == "O3":
                continue
            pre = grp[grp.t < lock]["value"].mean()
            post = grp[grp.t >= lock]["value"].mean()
            assert post < pre, f"{sid} ({attr_of[sid]}) did not drop"

    def test_covid_coupling_weakens_after_lockdown(self, spark, cov):
        lock = cov.meta["lockdown_tick"]
        pdf = cov.readings.toPandas()
        pre = pdf[pdf.t < lock]
        post = pdf[pdf.t >= lock]
        # PM2.5 vs NO2 in Shanghai (cv00000, cv00003)
        assert abs(_corr_of(pre, "cv00000", "cv00003")) > abs(_corr_of(post, "cv00000", "cv00003"))
