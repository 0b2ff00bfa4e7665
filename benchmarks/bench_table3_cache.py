"""Benchmark for Table 3 — the §3.3 caching mechanism: cold mining vs
cache-served repeats of the same (dataset, parameters)."""
from benchmarks._util import record
from repro.tables import table3_cache


def test_table3_cache(spark, benchmark):
    df = benchmark.pedantic(
        lambda: table3_cache.run(spark, scale=0.05), rounds=1, iterations=1
    )
    record("table3_cache", df.to_string(index=False))
    per_psi = df[df["psi"] != "total"]
    assert (per_psi["speedup"] > 10).all()
    assert (per_psi["warm_s"] < per_psi["cold_s"]).all()
