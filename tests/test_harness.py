"""Table I / Table II harnesses (scaled-down runs) and measure plumbing."""
import math

import numpy as np
import pytest

from repro.datasets import blobs, equal_quotas
from repro.harness.measures import Measure, average, run_algo
from repro.harness.table1 import PAPER_TABLE1, run_table1
from repro.harness.table2 import algos_for, format_table2, run_table2


def test_paper_table1_shape():
    assert list(PAPER_TABLE1["dataset"]) == [
        "Adult", "CelebA", "Census", "Lyrics", "Synthetic",
    ]


def test_run_table1_structure():
    df = run_table1(scale=0.01)
    assert list(df.columns) == ["dataset", "n", "m", "#features", "metric"]
    row = df[df["dataset"] == "Adult"].iloc[0]
    assert row["m"] == "2/5/10" or row["m"].startswith("2/5")
    assert row["#features"] == 6
    assert df[df["dataset"] == "Lyrics"].iloc[0]["metric"] == "angular"


def test_algos_for_m():
    assert "SFDM1" in algos_for(2) and "FairSwap" in algos_for(2)
    assert algos_for(5) == ["GMM", "FairFlow", "SFDM2"]


@pytest.mark.parametrize("algo", ["GMM", "FairSwap", "FairFlow", "FairGMM", "SFDM1", "SFDM2"])
def test_run_algo_each(algo):
    ds = blobs(400, 2, seed=1)
    ks = equal_quotas(6, ds.groups)
    m = run_algo(algo, ds, ks, eps=0.15, seed=0)
    assert m.algo == algo
    assert m.diversity > 0
    assert m.time_s >= 0
    if algo in ("SFDM1", "SFDM2"):
        assert m.n_elem > 0 and not math.isnan(m.update_us)
    else:
        assert math.isnan(m.n_elem)


def test_run_algo_unknown():
    ds = blobs(100, 2)
    with pytest.raises(ValueError):
        run_algo("NOPE", ds, {0: 1, 1: 1})


def test_run_algo_permutes_by_seed():
    ds = blobs(300, 2, seed=2)
    ks = equal_quotas(6, ds.groups)
    a = run_algo("SFDM2", ds, ks, seed=0)
    b = run_algo("SFDM2", ds, ks, seed=1)
    # different stream orders may (and typically do) give different stores
    assert a.diversity > 0 and b.diversity > 0


def test_average_measures():
    ms = [
        Measure("X", 1.0, 2.0, 3.0, 4.0, 5.0),
        Measure("X", 3.0, 4.0, 5.0, 6.0, 7.0),
    ]
    avg = average(ms)
    assert avg.diversity == 2.0 and avg.time_s == 3.0 and avg.n_elem == 6.0


def test_run_table2_tiny_subset():
    df = run_table2(
        k=6, runs=1, scale=0.005,
        configs=[("Adult", "sex", 0.15)],
    )
    adult = df[(df["dataset"] == "Adult")]
    assert set(adult["algo"]) == {"GMM", "FairSwap", "FairFlow", "SFDM1", "SFDM2"}
    lyr = run_table2(  # m=15 needs k >= m (paper: one element per group)
        k=15, runs=1, scale=0.005, configs=[("Lyrics", "genre", 0.1)],
    )
    assert set(lyr["algo"]) == {"GMM", "FairFlow", "SFDM2"}
    df = __import__("pandas").concat([df, lyr], ignore_index=True)
    # fair solutions are never more diverse than the unconstrained GMM * 2
    for (_, _), sub in df.groupby(["dataset", "grouping"]):
        gmm_div = sub[sub["algo"] == "GMM"]["diversity"].iloc[0]
        assert (sub["diversity"] <= 2 * gmm_div + 1e-9).all()
    text = format_table2(df)
    assert "SFDM2" in text and "Adult" in text


def test_run_table2_proportional_quota():
    df = run_table2(
        k=6, runs=1, scale=0.005, quota="proportional",
        configs=[("Adult", "sex", 0.15)],
    )
    assert len(df) == 5


def test_table2_streaming_columns_populated():
    df = run_table2(
        k=6, runs=2, scale=0.005, configs=[("CelebA", "sex", 0.15)],
    )
    s = df[df["algo"] == "SFDM2"].iloc[0]
    assert s["n_elem"] > 0
    assert s["stream_s"] > 0
    assert s["update_us"] > 0
