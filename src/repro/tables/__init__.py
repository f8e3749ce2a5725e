"""Harnesses that regenerate the paper's evaluation tables."""

from repro.tables.table2 import run_table2
from repro.tables.table5 import run_table5

__all__ = ["run_table2", "run_table5"]
