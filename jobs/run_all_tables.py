"""Reproduce every evaluation table (3–12) in one session.

Usage:
    python jobs/run_all_tables.py [--timeout 60] [--out results] [--tables 3 4 5]

Artifacts land in results/tableNN.{md,json}; the combined markdown is
the raw material for EXPERIMENTS.md.
"""
from __future__ import annotations

import argparse
import sys
import time

from _session import get_session
from run_table import run_table

from repro.bench.harness import clear_cache, TIMEOUT_SECONDS
from repro.bench.tables import TABLES


def main() -> None:
    ap = argparse.ArgumentParser(description=__doc__)
    ap.add_argument("--timeout", type=float, default=TIMEOUT_SECONDS)
    ap.add_argument("--out", default="results")
    ap.add_argument("--tables", type=int, nargs="*", default=sorted(TABLES))
    args = ap.parse_args()
    spark = get_session("skyline-all-tables")
    t0 = time.time()
    try:
        for t in args.tables:
            run_table(spark, t, args.timeout, args.out)
    finally:
        clear_cache()
        spark.stop()
    print(f"total wall time: {time.time() - t0:.0f}s", file=sys.stderr)


if __name__ == "__main__":
    main()
