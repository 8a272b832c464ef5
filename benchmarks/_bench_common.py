"""Shared plumbing for the table benchmarks.

Each benchmark runs its table's experiment exactly once (pedantic,
rounds=1): the interesting numbers are the *throughput cells inside* the
table (measured with the Section-6 methodology by the harness itself), not
pytest-benchmark's wall-clock of the whole table. Rows are printed and also
persisted to ``benchmarks/results/<table>.json`` so EXPERIMENTS.md can be
regenerated from the last run.
"""
from __future__ import annotations

import json
import os
from typing import Any, Dict, List

RESULTS_DIR = os.path.join(os.path.dirname(__file__), "results")


def run_table(benchmark, name: str, fn, *args, **kwargs) -> List[Dict[str, Any]]:
    rows = benchmark.pedantic(
        lambda: fn(*args, **kwargs), rounds=1, iterations=1, warmup_rounds=0
    )
    from repro.harness.metrics import format_table

    print(f"\n== {name} ==")
    print(format_table(rows))
    os.makedirs(RESULTS_DIR, exist_ok=True)
    with open(os.path.join(RESULTS_DIR, f"{name}.json"), "w") as f:
        json.dump(rows, f, indent=1, default=str)
    return rows
