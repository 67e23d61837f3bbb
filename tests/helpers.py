"""Shared test utilities: oracle-backed skyline correctness checks."""
from __future__ import annotations

import numpy as np
import pandas as pd

from repro.oracle import assert_equivalent
from repro.core.spec import DimType, SkylineSpec

__all__ = ["skyline_oracle_pandas", "assert_skyline_equals_oracle", "rand_points"]


def rand_points(rng: np.random.Generator, n: int, d: int, *,
                null_rate: float = 0.0, ties: bool = False) -> np.ndarray:
    """Random (n, d) float matrix, optionally with NaNs and heavy ties."""
    if ties:
        mm = rng.integers(0, 5, size=(n, d)).astype(np.float64)
    else:
        mm = rng.random((n, d))
    if null_rate > 0:
        mm[rng.random((n, d)) < null_rate] = np.nan
    return mm


def skyline_oracle_pandas(pdf: pd.DataFrame, spec: SkylineSpec, *,
                          incomplete: bool) -> pd.DataFrame:
    """Definitional skyline of a pandas frame (row-at-a-time, O(n²))."""
    def dominates(r, s) -> bool:
        soft = True
        strict = False
        for d in spec.dimensions:
            rv, sv = r[d.expr], s[d.expr]
            r_null, s_null = pd.isna(rv), pd.isna(sv)
            if incomplete and (r_null or s_null):
                continue
            if r_null or s_null:
                return False  # complete semantics: NULL never dominates
            if d.dim_type is DimType.DIFF:
                if rv != sv:
                    return False
                continue
            if d.dim_type is DimType.MAX:
                rv, sv = -rv, -sv
            if rv > sv:
                soft = False
                break
            if rv < sv:
                strict = True
        return soft and strict

    rows = list(pdf.index)
    keep = []
    for i in rows:
        if not any(dominates(pdf.loc[j], pdf.loc[i]) for j in rows if j != i):
            keep.append(i)
    return pdf.loc[keep]


def assert_skyline_equals_oracle(spark_df, input_pdf: pd.DataFrame,
                                 spec: SkylineSpec, *, incomplete: bool) -> None:
    """Diff a Spark skyline result against the definitional pandas oracle.

    Uses the DuckDB-equality machinery of repro.oracle for canonical
    row comparison by registering the oracle output as a table.
    """
    expected = skyline_oracle_pandas(input_pdf, spec, incomplete=incomplete)
    cols = ", ".join(spark_df.columns)
    assert_equivalent(spark_df, f"SELECT {cols} FROM expected", expected=expected)
