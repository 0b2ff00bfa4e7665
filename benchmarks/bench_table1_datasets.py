"""Benchmark for Table 1 — dataset generation at bench scale.

Regenerates the EXPERIMENTS.md §T1 rows; the measured time is the cost
of synthesizing all four datasets (the demo's "upload" substrate input).
"""
from benchmarks._util import record
from repro.tables import table1_datasets


def test_table1_datasets(spark, benchmark):
    df = benchmark.pedantic(
        lambda: table1_datasets.run(spark, scale=0.05), rounds=1, iterations=1
    )
    record("table1_datasets", df.to_string(index=False))
    assert list(df["dataset"]) == ["santander", "china6", "china13", "covid19"]
    assert (df["records"] > 0).all()
    assert df.loc[df["dataset"] == "covid19", "sensors"].iloc[0] == 12
