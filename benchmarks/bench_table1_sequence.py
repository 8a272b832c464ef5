"""Table 1 (paper Figure 7): sequence queries with output, n = 3,5,7,9,
count window T=100 — throughput, update throughput, enumeration throughput,
memory, for CORE vs SASE-/Esper-/FlinkCEP-style baselines."""
import pytest

from _bench_common import run_table
from repro.harness.experiments import table1_sequence


@pytest.mark.benchmark(group="table1")
def test_table1_sequence(benchmark):
    rows = run_table(benchmark, "table1", table1_sequence)
    core = {r["query"]: r["throughput_eps"] for r in rows if r["system"] == "core"}
    # Paper claim: CORE's throughput is stable, degrading only ~linearly in n.
    assert core["seq n=9"] > core["seq n=3"] / 6
    # Paper claim: materializing systems degrade super-linearly in n.
    for system in ("sase", "flink"):
        by_n = {r["query"]: r["throughput_eps"] for r in rows if r["system"] == system}
        assert by_n["seq n=9"] < by_n["seq n=3"] / 6
