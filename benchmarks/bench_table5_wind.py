"""Benchmark for Table 5 — the China wind-direction case: east–west vs
north–south neighbor-pair co-evolution (§4)."""
from benchmarks._util import record
from repro.tables import table5_wind


def test_table5_wind(spark, benchmark):
    df = benchmark.pedantic(
        lambda: table5_wind.run(spark, scale=0.008), rounds=1, iterations=1
    )
    record("table5_wind", df.to_string(index=False))
    by = df.set_index("orientation")
    ew, ns = by.loc["east_west"], by.loc["north_south"]
    assert ew["mean_support"] > 5 * max(ns["mean_support"], 0.01)
    assert ew["coevolving_frac"] > ns["coevolving_frac"]
