"""Benchmark E1 — §6.2 Q3 intra-task DOP tuning (baseline + tuned +
Fig. 22 sweeps)."""
from repro.experiments import q3_intratask


def test_q3_intratask(benchmark):
    res = benchmark.pedantic(q3_intratask.run, rounds=1, iterations=1)
    assert res["reduction_pct"] > 45.0
