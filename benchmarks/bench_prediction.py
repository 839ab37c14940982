"""Benchmark E5 — §6.5.1 remaining-time prediction accuracy."""
from repro.experiments import prediction


def test_prediction(benchmark):
    res = benchmark.pedantic(prediction.run, rounds=1, iterations=1)
    assert all(p["abs_error_s"] < 8.0 for p in res["predictions"])
