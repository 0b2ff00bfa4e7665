"""Benchmark for Table 6 — COVID-19 before/after levels and CAP-set
shift (§4, Figure 4)."""
from benchmarks._util import record
from repro.tables import table6_covid


def test_table6_covid(spark, benchmark):
    levels, caps = benchmark.pedantic(
        lambda: table6_covid.run(spark, scale=0.25), rounds=1, iterations=1
    )
    record("table6_covid",
           levels.to_string(index=False) + "\n\n" + caps.to_string(index=False))
    non_o3 = levels[levels["attribute"] != "O3"]
    assert (non_o3["after"] < non_o3["before"]).all()
    by = caps.set_index("period")
    assert by.loc["after", "n_caps"] < by.loc["before", "n_caps"]
