"""Table 2 (paper Figure 8 left): A1;A2;A3 with A3 hidden (no output),
window T = 50..200 — the worst case for partial-match materialization."""
import pytest

from _bench_common import run_table
from repro.harness.experiments import table2_window


@pytest.mark.benchmark(group="table2")
def test_table2_window(benchmark):
    rows = run_table(benchmark, "table2", table2_window)
    core = {r["query"]: r["throughput_eps"] for r in rows if r["system"] == "core"}
    sase = {r["query"]: r["throughput_eps"] for r in rows if r["system"] == "sase"}
    # Paper claim: CORE stable in T; SASE degrades super-linearly in T and is
    # orders of magnitude behind at T=200.
    assert min(core.values()) > max(core.values()) / 4
    assert sase["seq n=3, T=200"] < sase["seq n=3, T=50"] / 4
    assert core["seq n=3, T=200"] > 20 * sase["seq n=3, T=200"]
