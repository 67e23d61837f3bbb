"""Reproduce one evaluation table (paper Tables 3–12).

Usage:
    python jobs/run_table.py --table 5 [--timeout 60] [--out results/table05.md]

Runs every cell of the table's grid (sweep × algorithms) on the scaled
datasets, prints the paper-style percentage and absolute-seconds rows,
and writes markdown + JSON artifacts under results/.
"""
from __future__ import annotations

import argparse
import json
import os
import sys
import time

from _session import get_session

from repro.bench.harness import run_cell, clear_cache, TIMEOUT_SECONDS
from repro.bench.report import render_results_markdown, results_to_json
from repro.bench.tables import table_def


def run_table(spark, table: int, timeout_s: float, out_dir: str | None) -> dict:
    tdef = table_def(table)
    results: dict = {}
    print(f"=== Table {table}: {tdef.caption}", file=sys.stderr)
    for cell in tdef.cells():
        key = (cell["sweep_value"], cell["algorithm"])
        t0 = time.time()
        secs = run_cell(
            spark,
            dataset=cell["dataset"], complete=cell["complete"], dims=cell["dims"],
            n=cell["n"], executors=cell["executors"], algorithm=cell["algorithm"],
            timeout_s=timeout_s,
        )
        results[key] = secs
        print(
            f"  {tdef.sweep}={cell['sweep_value']} algo={cell['algorithm']}: "
            f"{'t.o.' if secs is None else f'{secs:.2f}s'} "
            f"(wall {time.time() - t0:.1f}s)",
            file=sys.stderr,
        )
    params = (
        f"{tdef.dataset} ({'complete' if tdef.complete else 'incomplete'}), "
        f"sweep={tdef.sweep} {list(tdef.sweep_values)}, "
        f"fixed dims={tdef.fixed_dims}, executors={tdef.fixed_executors}, "
        f"timeout={timeout_s:.0f}s"
    )
    md = render_results_markdown(tdef, results, run_params=params)
    print(md)
    if out_dir:
        os.makedirs(out_dir, exist_ok=True)
        with open(os.path.join(out_dir, f"table{table:02d}.md"), "w") as f:
            f.write(md + "\n")
        with open(os.path.join(out_dir, f"table{table:02d}.json"), "w") as f:
            f.write(results_to_json(tdef, results))
    return results


def main() -> None:
    ap = argparse.ArgumentParser(description=__doc__)
    ap.add_argument("--table", type=int, required=True, choices=range(3, 13))
    ap.add_argument("--timeout", type=float, default=TIMEOUT_SECONDS)
    ap.add_argument("--out", default="results")
    args = ap.parse_args()
    spark = get_session(f"skyline-table-{args.table}")
    try:
        run_table(spark, args.table, args.timeout, args.out)
    finally:
        clear_cache()
        spark.stop()


if __name__ == "__main__":
    main()
