"""Benchmark for Table 7 — Santander case study: the §4 example
cross-attribute patterns must be among the discovered CAPs."""
from benchmarks._util import record
from repro.tables import table7_santander


def test_table7_santander(spark, benchmark):
    df = benchmark.pedantic(
        lambda: table7_santander.run(spark, scale=0.05), rounds=1, iterations=1
    )
    found = table7_santander.contains_paper_patterns(df)
    record("table7_santander",
           df.to_string(index=False) + f"\npaper_patterns: {found}")
    assert found["temperature+traffic"] and found["light+temperature"]
