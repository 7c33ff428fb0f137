"""Table I — dataset statistics.

Regenerates the paper's dataset-overview table from our synthetic stand-ins
(DESIGN.md §4). When given a SparkSession the row/group counts are computed
with DataFrame aggregations (and the tests oracle-check them against DuckDB);
otherwise numpy counts are used.
"""
from __future__ import annotations

import pandas as pd

from ..datasets import (
    ADULT_N, CELEBA_N, CENSUS_N, LYRICS_N,
    adult_like, celeba_like, census_like, lyrics_like,
)

PAPER_TABLE1 = pd.DataFrame(
    [
        ("Adult", 48_842, "2/5/10", 6, "Euclidean"),
        ("CelebA", 202_599, "2/4", 41, "Manhattan"),
        ("Census", 2_426_116, "2/7/14", 25, "Manhattan"),
        ("Lyrics", 122_448, "15", 50, "Angular"),
        ("Synthetic", "10^3-10^7", "2-20", 2, "Euclidean"),
    ],
    columns=["dataset", "n", "m", "#features", "metric"],
)


def dataset_suite(scale: float = 1.0):
    """The (dataset builder, groupings) suite behind Tables I/II."""
    return [
        ("Adult", lambda grouping: adult_like(max(100, int(ADULT_N * scale)), grouping),
         ["sex", "race", "sex+race"]),
        ("CelebA", lambda grouping: celeba_like(max(100, int(CELEBA_N * scale)), grouping),
         ["sex", "age", "sex+age"]),
        ("Census", lambda grouping: census_like(max(100, int(CENSUS_N * scale)), grouping),
         ["sex", "age", "sex+age"]),
        ("Lyrics", lambda grouping: lyrics_like(max(100, int(LYRICS_N * scale))),
         ["genre"]),
    ]


def run_table1(spark=None, scale: float = 1.0) -> pd.DataFrame:
    """Measured Table I over the stand-ins (n / m per grouping / dim / metric)."""
    rows = []
    for name, build, groupings in dataset_suite(scale):
        ms, ds = [], None
        for grouping in groupings:
            ds = build(grouping)
            if spark is not None:
                sdf = ds.to_spark(spark)
                n = sdf.count()
                m = sdf.select("group").distinct().count()
            else:
                n, m = ds.n, ds.m
            ms.append(str(m))
        rows.append((name, n, "/".join(dict.fromkeys(ms)), ds.dim, ds.metric_name))
    return pd.DataFrame(rows, columns=["dataset", "n", "m", "#features", "metric"])
