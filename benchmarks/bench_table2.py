"""Benchmark T2/E3 — Q2J DOP switching: regenerates Table 2 and the
§6.4.1 headline numbers."""
from repro.experiments import q2j_switching


def test_q2j_dop_switching(benchmark):
    res = benchmark.pedantic(q2j_switching.run, rounds=1, iterations=1)
    assert len(res["table2"]) == 3
    assert res["reduction_pct"] > 45.0
