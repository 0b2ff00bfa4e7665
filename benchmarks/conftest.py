"""Benchmark-local conftest: re-exports the session Spark fixture from
the repo-root conftest (pytest picks the root one up automatically; this
file only holds benchmark defaults)."""


def pytest_collection_modifyitems(items):
    # benchmarks are ordered by table number for a readable report
    items.sort(key=lambda it: it.name)
