"""Benchmark utilities: persist each regenerated table under
``results/`` so EXPERIMENTS.md can be diffed against the exact rows of
the last benchmark run (stdout of passing benchmarks is captured by
pytest and otherwise lost)."""
from pathlib import Path

RESULTS_DIR = Path(__file__).resolve().parent.parent / "results"


def record(name: str, text: str) -> None:
    RESULTS_DIR.mkdir(exist_ok=True)
    (RESULTS_DIR / f"{name}.txt").write_text(text + "\n")
    print(f"\n[{name}]\n{text}")
