"""Job T1 — reproduce Table 1 (TPCH table setup / partitioning scheme).

Usage: spark-submit jobs/table1_setup.py  (or plain python; no Spark
needed — the table generators run on pandas for this job).
"""
import sys

from repro.experiments import table1
from repro.experiments.report import format_table, human_bytes


def main(sf: float = 0.1) -> None:
    res = table1.run(sf=sf)
    rows = [
        {
            "Table": r["table"],
            "Partitioning scheme": r["partitioning"],
            "Table size": human_bytes(r["measured_bytes"]),
            "Split size": human_bytes(r["measured_split_bytes"]),
            "Paper size (SF100)": human_bytes(r["paper_bytes_sf100"]),
            "Paper split (SF100)": human_bytes(r["paper_split_bytes_sf100"]),
        }
        for r in res["rows"]
    ]
    print(format_table(rows, title=f"Table 1 — TPCH-lite setup at SF{sf} (paper: SF100)"))
    print(
        f"\nTotal measured: {human_bytes(res['measured_total_bytes'])} "
        f"(paper total: {human_bytes(res['paper_total_bytes'])})"
    )


if __name__ == "__main__":
    main(float(sys.argv[1]) if len(sys.argv) > 1 else 0.1)
