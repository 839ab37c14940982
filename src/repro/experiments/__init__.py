"""Evaluation-section reproductions (see DESIGN.md §3 for the per-table
index): T1 = Table 1, T2+E3 = Table 2 / §6.4.1, E1 = §6.2, E2 = §6.3,
E4 = §6.4.2, E5 = §6.5.1, E6 = §6.5.2."""
from repro.experiments import (  # noqa: F401
    autotune,
    elastic_shuffle,
    prediction,
    q2j_switching,
    q3_intrastage,
    q3_intratask,
    table1,
)
