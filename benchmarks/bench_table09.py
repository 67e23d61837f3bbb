"""pytest-benchmark suite for paper Table 9 (executors sweep).

Regenerates Table 9's grid at bench scale (see benchmarks/common.py);
the full-scale numbers recorded in EXPERIMENTS.md come from
``python jobs/run_table.py --table 9``.
"""
import pytest

from repro.bench.tables import table_def

from benchmarks.common import run_cell_benchmark

TDEF = table_def(9)
SWEEP_SUBSET = [1, 5, 10]


@pytest.mark.parametrize("algorithm", TDEF.algorithms)
@pytest.mark.parametrize("sweep_value", SWEEP_SUBSET)
def test_table09(spark, benchmark, sweep_value, algorithm):
    benchmark.group = f"table09:{TDEF.sweep}={sweep_value}"
    run_cell_benchmark(spark, benchmark, 9, sweep_value, algorithm)
