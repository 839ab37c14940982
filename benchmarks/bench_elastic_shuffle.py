"""Benchmark E4 — §6.4.2 elastic shuffle stage."""
from repro.experiments import elastic_shuffle


def test_elastic_shuffle(benchmark):
    res = benchmark.pedantic(elastic_shuffle.run, rounds=1, iterations=1)
    assert res["reduction_pct"] > 20.0
