"""Shared plumbing for the spark-submit experiment jobs."""
from __future__ import annotations

import argparse
import sys


def parse_args(description: str, *, needs_spark: bool = False):
    ap = argparse.ArgumentParser(description=description)
    ap.add_argument(
        "--budget", type=float, default=None,
        help="seconds of measurement per cell (default REPRO_BENCH_BUDGET or 0.4)",
    )
    ap.add_argument(
        "--events", type=int, default=200_000,
        help="pre-generated stream length",
    )
    ap.add_argument("--seed", type=int, default=0)
    return ap.parse_args()


def emit(rows) -> None:
    from repro.harness.metrics import format_table

    print(format_table(rows))
    sys.stdout.flush()
