"""pytest-benchmark suite for paper Table 6 (dims sweep).

Regenerates Table 6's grid at bench scale (see benchmarks/common.py);
the full-scale numbers recorded in EXPERIMENTS.md come from
``python jobs/run_table.py --table 6``.
"""
import pytest

from repro.bench.tables import table_def

from benchmarks.common import run_cell_benchmark

TDEF = table_def(6)
SWEEP_SUBSET = [1, 6]


@pytest.mark.parametrize("algorithm", TDEF.algorithms)
@pytest.mark.parametrize("sweep_value", SWEEP_SUBSET)
def test_table06(spark, benchmark, sweep_value, algorithm):
    benchmark.group = f"table06:{TDEF.sweep}={sweep_value}"
    run_cell_benchmark(spark, benchmark, 6, sweep_value, algorithm)
