"""Experiment T1 — reproduce Table 1 (TPCH-SF100 table setup).

Generates every TPC-H-lite table at a laptop scale factor, partitions it
with the paper's exact scheme (nodes x splits/node), and measures table
and split sizes. The paper's SF100 bytes are reported alongside, plus the
measured-vs-paper size *ratio per table* — at a fixed SF that ratio should
be roughly constant across tables (same schema shape), which is the
property that makes the simulator's use of the paper's SF100 volumes
sound.
"""
from __future__ import annotations

from repro.queries.catalog import PAPER_TOTAL_BYTES, build_setup_rows


def run(*, sf: float = 0.01) -> dict:
    rows = build_setup_rows(sf)
    total = sum(r["measured_bytes"] for r in rows)
    for r in rows:
        r["measured_over_paper"] = r["measured_bytes"] / r["paper_bytes_sf100"]
    return {
        "sf": sf,
        "rows": rows,
        "measured_total_bytes": total,
        "paper_total_bytes": PAPER_TOTAL_BYTES,
    }
