"""Plain-SQL reference rewrite of skyline queries (paper Listing 4, [5, 15]).

Given a base query and a skyline spec whose dimensions are output
columns of that base, produce the ``WHERE NOT EXISTS`` formulation:

    SELECT <cols> FROM (<base>) AS o WHERE NOT EXISTS (
        SELECT 1 FROM (<base>) AS i
        WHERE i.a1 <= o.a1 AND ... AND (i.a1 < o.a1 OR ...))

This is the paper's "reference" algorithm (§6.3 item 4) *and* the
correctness oracle: the generated SQL is engine-neutral, so the same
text runs on Spark SQL (baseline measurements) and on DuckDB
(result-equality checks via ``repro.oracle``).

For incomplete data the standard rewrite computes SQL three-valued
semantics (a NULL comparison never satisfies the dominance conjuncts),
which is *not* the §3 null-aware dominance.  ``null_aware=True`` emits
the explicit IS NULL disjuncts so the reference returns exactly the
same rows as the specialized incomplete algorithm.
"""
from __future__ import annotations

from ..core.physical import not_exists_condition
from ..core.spec import SkylineSpec

__all__ = ["reference_sql", "reference_sql_for_table"]


def _check_dims_are_columns(spec: SkylineSpec) -> list[str]:
    cols = []
    for d in spec.dimensions:
        if not d.is_simple_column:
            raise ValueError(
                f"reference rewrite requires dimension {d.expr!r} to be a plain "
                "output column — run the analyzer first to materialize expressions"
            )
        cols.append(d.expr)
    return cols


def reference_sql(base_sql: str, spec: SkylineSpec, *, null_aware: bool = False,
                  select: str = "*") -> str:
    """Listing-4 rewrite over a base *query* (used as a derived table)."""
    cols = _check_dims_are_columns(spec)
    cond = not_exists_condition(spec, cols, null_aware=null_aware)
    out = (
        f"SELECT {select} FROM ({base_sql}) AS o WHERE NOT EXISTS ("
        f"SELECT 1 FROM ({base_sql}) AS i WHERE {cond})"
    )
    if spec.distinct:
        # One arbitrary representative per distinct dimension tuple: only
        # meaningful when the projection is (a subset of) the dimensions.
        out = f"SELECT DISTINCT {select} FROM ({out}) AS __sky_distinct"
    return out


def reference_sql_for_table(table: str, spec: SkylineSpec, *, null_aware: bool = False,
                            select: str = "*") -> str:
    """Listing-4 rewrite over a named table/view (closest to the paper's text)."""
    cols = _check_dims_are_columns(spec)
    cond = not_exists_condition(spec, cols, null_aware=null_aware)
    out = (
        f"SELECT {select} FROM {table} AS o WHERE NOT EXISTS ("
        f"SELECT 1 FROM {table} AS i WHERE {cond})"
    )
    if spec.distinct:
        out = f"SELECT DISTINCT {select} FROM ({out}) AS __sky_distinct"
    return out
