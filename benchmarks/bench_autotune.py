"""Benchmark E6 — §6.5.2 automatic DOP tuning (Q2 + Q3)."""
from repro.experiments import autotune


def test_autotune(benchmark):
    res = benchmark.pedantic(autotune.run, rounds=1, iterations=1)
    assert res["q2"]["met"] and res["q3"]["met"]
