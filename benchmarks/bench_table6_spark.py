"""Table 6 (extra, beyond the paper): PARTITION BY evaluated
driver-sequentially (the paper's execution model) vs distributed over Spark
tasks with applyInPandas."""
import pytest

from _bench_common import run_table
from repro.harness.experiments import table6_spark


@pytest.mark.benchmark(group="table6")
def test_table6_spark(benchmark, spark):
    rows = run_table(benchmark, "table6", table6_spark, spark)
    for r in rows:
        # identical results on both execution paths
        assert r["driver_outputs"] == r["spark_outputs"]
