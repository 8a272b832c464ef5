"""Tests for the synthetic stream generators."""
import numpy as np
import pytest

from repro.streams.generators import (
    MAJOR_NAMES,
    random_stream,
    stock_stream,
    to_pandas,
    typed_stream,
)


def test_typed_stream_types_and_determinism():
    s1 = typed_stream(500, ["A", "B"], seed=3)
    s2 = typed_stream(500, ["A", "B"], seed=3)
    assert s1 == s2
    assert {e["type"] for e in s1} == {"A", "B"}


def test_random_stream_alphabet():
    s = random_stream(2000, n_seq=3, seed=0)
    types = {e["type"] for e in s}
    assert types == {"A1", "A2", "A3", "B1", "B2", "B3", "B4", "B5", "B6"}


def test_random_stream_hide_last_omits_final_type():
    s = random_stream(2000, n_seq=3, hide_last=True, seed=0)
    types = {e["type"] for e in s}
    assert "A3" not in types and "A1" in types and "A2" in types


def test_random_stream_roughly_uniform():
    s = random_stream(18000, n_seq=3, seed=1)
    counts = {}
    for e in s:
        counts[e["type"]] = counts.get(e["type"], 0) + 1
    expect = 18000 / 9
    assert all(abs(c - expect) < 0.25 * expect for c in counts.values())


def test_stock_stream_schema_and_monotone_time():
    s = stock_stream(1000, seed=0)
    assert set(s[0]) == {"type", "name", "volume", "price", "stock_time"}
    times = [e["stock_time"] for e in s]
    assert all(t2 > t1 for t1, t2 in zip(times, times[1:]))
    assert all(e["type"] in ("BUY", "SELL") for e in s)
    assert all(e["name"] in MAJOR_NAMES for e in s)
    assert all(e["volume"] % 100 == 0 for e in s)


def test_stock_stream_window_density():
    # calibration: a 30 000 ms window should hold ~100 events (paper app. C)
    s = stock_stream(5000, seed=2)
    span = s[-1]["stock_time"] - s[0]["stock_time"]
    per_window = 5000 / (span / 30000)
    assert 60 < per_window < 160


def test_stock_prices_near_base():
    s = stock_stream(3000, seed=0)
    msft = [e["price"] for e in s if e["name"] == "MSFT"]
    assert msft and 5 < float(np.median(msft)) < 130


def test_to_pandas_adds_pos_and_handles_missing():
    pdf = to_pandas([{"type": "A", "x": 1}, {"type": "B"}])
    assert list(pdf["pos"]) == [0, 1]
    assert pdf["x"].isna().iloc[1]


def test_to_pandas_explicit_columns():
    pdf = to_pandas([{"type": "A", "x": 1}], columns=["type"])
    assert list(pdf.columns) == ["pos", "type"]
