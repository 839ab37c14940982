"""The Spark data plane: run a workload query split-incrementally on the
real SparkSession while a tuning script changes the DOP mid-query.

This is the bridge between the engine's control plane and real data: the
probe table is processed batch-by-batch (Accordion's split-at-a-time
table scan), and each scripted ``AP``/``AC`` action maps to the shuffle
DOP of the batches that follow it — Spark's runtime-parallelism knob for
jobs inside one logical query. Results are DataFrames the DuckDB oracle
can diff, so "the DOP changed mid-query" and "the answer is right" are
checked together.
"""
from __future__ import annotations

from dataclasses import dataclass

from pyspark.sql import DataFrame, SparkSession

from repro.core.script import ScriptAction, parse_script
from repro.spark_iqre.microbatch import MicrobatchRun, run_microbatch


def script_to_dop_schedule(actions: list[ScriptAction], *, initial_dop: int = 2) -> list[int]:
    """Derive a per-batch shuffle-DOP schedule from a tuning script.

    One batch runs at the initial DOP, then one batch per scripted
    parallelism change, at that action's target DOP — the micro-batch
    analogue of "the adjustment takes effect from this point on".
    """
    schedule = [initial_dop]
    for a in sorted(actions, key=lambda a: a.t):
        if a.kind in ("AP", "AC", "RP"):
            schedule.append(max(1, a.b))
    return schedule


@dataclass
class SparkPlaneResult:
    run: MicrobatchRun
    schedule: list[int]

    @property
    def result(self) -> DataFrame:
        return self.run.result


def run_with_script(
    spark: SparkSession,
    query: str,
    tables: dict[str, DataFrame],
    script_text: str,
    *,
    initial_dop: int = 2,
) -> SparkPlaneResult:
    """Execute ``query`` on real data, applying a paper-notation tuning
    script ("AP S1,2,4 @ 10" …) as mid-query DOP changes."""
    schedule = script_to_dop_schedule(parse_script(script_text), initial_dop=initial_dop)
    run = run_microbatch(
        spark, query, tables, n_batches=len(schedule), dop_schedule=schedule
    )
    return SparkPlaneResult(run=run, schedule=schedule)
