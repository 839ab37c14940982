"""Benchmark T1 — Table 1 setup: generate + partition all TPC-H-lite
tables at the benchmark scale factor and measure sizes."""
from repro.experiments import table1


def test_table1_setup(benchmark):
    res = benchmark.pedantic(table1.run, kwargs={"sf": 0.1}, rounds=1, iterations=1)
    assert len(res["rows"]) == 8
    assert res["measured_total_bytes"] > 0
