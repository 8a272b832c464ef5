"""Table 3 (paper Figure 8 right): selection strategies on A1;A2;A3, T=100,
A3 hidden. CORE x {ALL,NEXT,LAST,MAX} vs baselines' default strategy."""
import pytest

from _bench_common import run_table
from repro.harness.experiments import table3_selection


@pytest.mark.benchmark(group="table3")
def test_table3_selection(benchmark):
    rows = run_table(benchmark, "table3", table3_selection)
    core = [r["throughput_eps"] for r in rows if r["system"] == "core"]
    others = [r["throughput_eps"] for r in rows if r["system"] != "core"]
    # Paper claim: CORE is flat across strategies and ahead of every baseline
    # even when the baselines use their performance-improving strategy.
    assert min(core) > max(core) / 4
    assert min(core) > max(others)
