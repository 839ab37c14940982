"""Benchmark E2 — §6.3 stage DOP tuning (Q3 + Q1/Q5/Q7 variants)."""
from repro.experiments import q3_intrastage


def test_q3_intrastage(benchmark):
    res = benchmark.pedantic(q3_intrastage.run, rounds=1, iterations=1)
    assert res["q3"]["reduction_pct"] > 60.0
