"""Workload: Table 1 catalog + TPC-H-lite query definitions."""
from repro.queries.catalog import TABLE1, build_setup_rows, sf100_bytes, split_table
from repro.queries.tpch import QUERIES, QueryDef, load_tables

__all__ = [
    "TABLE1",
    "build_setup_rows",
    "sf100_bytes",
    "split_table",
    "QUERIES",
    "QueryDef",
    "load_tables",
]
