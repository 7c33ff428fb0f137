"""Catalyst SQL expressions for distances over ``array<double>`` columns.

These run fully inside Spark SQL (higher-order functions: ``zip_with``,
``aggregate``) — no UDFs — so extent estimation and pairwise-distance checks
stay on the Catalyst path and are oracle-checkable against DuckDB.
"""
from __future__ import annotations

from pyspark.sql import Column
from pyspark.sql import functions as F


def distance_expr(a: str, b: str, metric: str) -> Column:
    """Column computing ``d(a, b)`` for two array<double> columns by name."""
    if metric == "euclidean":
        return F.expr(
            f"sqrt(aggregate(zip_with({a}, {b}, (x, y) -> (x - y) * (x - y)), "
            "0D, (acc, v) -> acc + v))"
        )
    if metric == "manhattan":
        return F.expr(
            f"aggregate(zip_with({a}, {b}, (x, y) -> abs(x - y)), "
            "0D, (acc, v) -> acc + v)"
        )
    if metric == "angular":
        dot = f"aggregate(zip_with({a}, {b}, (x, y) -> x * y), 0D, (acc, v) -> acc + v)"
        na = f"sqrt(aggregate({a}, 0D, (acc, v) -> acc + v * v))"
        nb = f"sqrt(aggregate({b}, 0D, (acc, v) -> acc + v * v))"
        return F.expr(
            f"acos(greatest(-1.0D, least(1.0D, ({dot}) / "
            f"(greatest({na} * {nb}, 1e-300)))))"
        )
    raise ValueError(f"unknown metric {metric!r}")
