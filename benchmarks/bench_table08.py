"""pytest-benchmark suite for paper Table 8 (tuples sweep).

Regenerates Table 8's grid at bench scale (see benchmarks/common.py);
the full-scale numbers recorded in EXPERIMENTS.md come from
``python jobs/run_table.py --table 8``.
"""
import pytest

from repro.bench.tables import table_def

from benchmarks.common import run_cell_benchmark

TDEF = table_def(8)
SWEEP_SUBSET = [1000000, 10000000]


@pytest.mark.parametrize("algorithm", TDEF.algorithms)
@pytest.mark.parametrize("sweep_value", SWEEP_SUBSET)
def test_table08(spark, benchmark, sweep_value, algorithm):
    benchmark.group = f"table08:{TDEF.sweep}={sweep_value}"
    run_cell_benchmark(spark, benchmark, 8, sweep_value, algorithm)
