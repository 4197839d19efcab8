"""Shared helpers for the per-table benchmarks.

Each benchmark runs its table's full experiment exactly once
(``benchmark.pedantic(rounds=1)``) — the experiments are deterministic in
their reported (simulated) metrics, and the pytest-benchmark timing records
the real wall cost of regenerating the table. The resulting table is also
written to ``results/<table>.txt`` so EXPERIMENTS.md numbers can be rebuilt.
"""
from __future__ import annotations

from pathlib import Path

import pandas as pd

from repro.core.tables import format_table

RESULTS = Path(__file__).resolve().parents[1] / "results"


def run_and_save(benchmark, fn, name: str, title: str) -> pd.DataFrame:
    df = benchmark.pedantic(fn, rounds=1, iterations=1)
    RESULTS.mkdir(exist_ok=True)
    (RESULTS / f"{name}.txt").write_text(format_table(df, title))
    df.to_csv(RESULTS / f"{name}.csv", index=False)
    return df
