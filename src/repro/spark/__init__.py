"""Distributed dataflow layer: PARTITION BY evaluation on Spark.

The paper leaves parallel/distributed execution as future work; this layer
realizes it on PySpark (the reproduction's `[distributed_dataflow]` element):

* ``batch``      — `groupBy(partition).applyInPandas`: one CER engine per
  partition, executed across Spark tasks over a bounded event DataFrame.
* ``streaming``  — Structured Streaming ``applyInPandasWithState`` stateful
  operator: per-key state holds the (pickled) engine whose tECS is bounded
  by the WITHIN window, i.e. automaton-based partial-match maintenance as a
  stateful streaming operator.
* ``sql_oracle`` — translates fixed-length CEQL patterns into DuckDB n-way
  self-join SQL so results can be checked with ``repro.oracle``.
"""
