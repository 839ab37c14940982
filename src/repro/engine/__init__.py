"""Presto-style execution engine substrate + Accordion's runtime elasticity.

Layering (bottom-up): pages/splits -> plan (fragments/stage tree) ->
pipelines/operators -> buffers -> tasks/stages -> scheduler (static +
dynamic) -> hashjoin (DOP switching) -> exec_sim (timing data plane).
"""
from repro.engine.exec_sim import SimExecutor, SimQuery, StageCost, TuningOutcome
from repro.engine.plan import StageTree, fragment_plan

__all__ = [
    "SimExecutor",
    "SimQuery",
    "StageCost",
    "TuningOutcome",
    "StageTree",
    "fragment_plan",
]
