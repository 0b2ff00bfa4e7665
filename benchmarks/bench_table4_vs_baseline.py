"""Benchmark for Table 4 — MISCELA's pruned search vs the unpruned and
fully naive baselines (§2.2 efficiency claim)."""
from benchmarks._util import record
from repro.tables import table4_vs_baseline


def test_table4_vs_baseline(spark, benchmark):
    df = benchmark.pedantic(
        lambda: table4_vs_baseline.run(spark, scale=0.05), rounds=1, iterations=1
    )
    record("table4_vs_baseline", df.to_string(index=False))
    assert (df["miscela_nodes"] <= df["noprune_nodes"]).all()
    assert (df["noprune_nodes"] <= df["naive_nodes"]).all()
    # at least one ψ must show real pruning, else the table shows nothing
    assert (df["miscela_nodes"] < df["naive_nodes"]).any()
