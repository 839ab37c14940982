"""Experiments T2 + E3 — §6.4.1 partitioned hash join DOP switching (Q2J).

Reproduces Table 2 (state-transfer decomposition of each DOP switch into
reshuffle + hash-table build time) and the §6.4.1 narrative:

* baseline: Q2J at stage DOP 2 = 1331.99 s (paper);
* three DOP switches (2→4, 4→6, 6→8) via new task groups fed from the
  intermediate data cache; probing is never interrupted (the old task
  group keeps serving during each rebuild);
* a fourth request near the end is rejected (T_remain < T_build);
* paper tuned result: 584.01 s, a 56.16 % reduction; query initialization
  284 ms; stage-DOP tuning control latency ~23 ms on average.

Paper Table 2:  2->4: total 42.67, shuffle 12.55, build 30.12
               4->6: total 29.03, shuffle  8.80, build 21.03
               6->8: total 21.61, shuffle  5.12, build 16.49
"""
from __future__ import annotations

from repro.core import AutoTuner, ScriptExecutor
from repro.engine.exec_sim import SimExecutor
from repro.experiments.report import reduction_pct
from repro.queries.tpch import QUERIES

PAPER = {
    "baseline_s": 1331.991,
    "tuned_s": 584.01,
    "reduction_pct": 56.16,
    "init_time_s": 0.284,
    "tuning_latency_s": 0.023,
    "table2": [
        {"DOP switching": "2 -> 4", "Total time": 42.67, "Shuffle time": 12.55, "Build time": 30.12},
        {"DOP switching": "4 -> 6", "Total time": 29.03, "Shuffle time": 8.80, "Build time": 21.03},
        {"DOP switching": "6 -> 8", "Total time": 21.61, "Shuffle time": 5.12, "Build time": 16.49},
    ],
}

SCRIPT = """
AP S1,2,4 @ 120
AP S1,4,6 @ 290
AP S1,6,8 @ 450
AP S1,8,10 @ 560
"""


def run() -> dict:
    qdef = QUERIES["Q2J"]
    baseline = SimExecutor(qdef.sim_query(), stage_dop=2, task_dop=1).run()

    ex = SimExecutor(qdef.sim_query(), stage_dop=2, task_dop=1)
    tuner = AutoTuner(ex)
    script = ScriptExecutor.from_text(SCRIPT)
    # Track whether probing ever pauses during a rebuild (Fig. 26: it must
    # not): sample stage-1 consumption around each switch.
    tuned = ex.run(controllers=[script.controller(tuner)])

    applied = [e for e in tuner.log if e.accepted]
    latencies = [e.latency_s for e in applied]
    # Probe continuity: between each switch request and its completion the
    # join stage kept consuming bytes (old task group still serving).
    continuity = []
    for op in ex.rebuild_log:
        st = ex.states[op.stage_id]
        consumed_during = _consumed_between(st, op.started_at, op.done_at)
        continuity.append(
            {"switch": f"{op.old_dop} -> {op.new_dop}", "bytes_during_rebuild": consumed_during}
        )

    return {
        "paper": PAPER,
        "baseline_s": baseline,
        "tuned_s": tuned,
        "reduction_pct": reduction_pct(baseline, tuned),
        "init_time_s": ex.exe.init_time_s,
        "tuning_latency_avg_s": sum(latencies) / len(latencies) if latencies else 0.0,
        "table2": [r.as_row() for r in ex.state_transfers],
        "rejected": [f"{a.notation()} — {a.reason}" for a in script.rejected()],
        "probe_continuity": continuity,
    }


def _consumed_between(st, t0: float, t1: float) -> float:
    samples = st.cum_consumed_samples
    c0 = c1 = None
    for t, c in samples:
        if t <= t0:
            c0 = c
        if t <= t1:
            c1 = c
    if c0 is None or c1 is None:
        return 0.0
    return c1 - c0
