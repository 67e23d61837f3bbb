"""Reproduction of "Integration of Skyline Queries into Spark SQL" (EDBT 2023).

Public entry points:

* :func:`repro.api.skyline` with :func:`smin` / :func:`smax` /
  :func:`sdiff` — the DataFrame API (§5.8);
* :func:`repro.sqlext.sky_sql` — extended-SQL execution with the
  ``SKYLINE OF`` clause (§5.1);
* :mod:`repro.bench` — the Table 3–12 experiment harness (§6).
"""
__version__ = "0.1.0"
