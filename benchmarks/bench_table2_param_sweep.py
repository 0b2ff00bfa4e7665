"""Benchmark for Table 2 — the §2.1 parameter-sensitivity sweep on
Santander-lite (12 full mining runs)."""
from benchmarks._util import record
from repro.tables import table2_param_sweep


def test_table2_param_sweep(spark, benchmark):
    df = benchmark.pedantic(
        lambda: table2_param_sweep.run(spark, scale=0.05), rounds=1, iterations=1
    )
    directions = table2_param_sweep.direction_ok(df)
    record("table2_param_sweep",
           df.to_string(index=False) + f"\ndirections_ok: {directions}")
    assert all(directions.values()), directions
