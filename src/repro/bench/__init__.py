"""Benchmark harness reproducing the paper's evaluation tables (§6, App. D)."""
from .harness import run_cell, timed_action, TIMEOUT_SECONDS  # noqa: F401
from .tables import TABLES, table_def  # noqa: F401
