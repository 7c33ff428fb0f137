"""Table II — overview of all algorithms at k = 20.

For every (dataset, grouping) row of the paper's Table II, runs the
applicable algorithms (FairSwap/SFDM1 only when m = 2; FairGMM excluded
exactly as in the paper) over ``runs`` random stream permutations and
averages the measures. ``scale`` shrinks every dataset for quick runs/tests.
"""
from __future__ import annotations

import pandas as pd

from ..datasets import clamp_quotas, equal_quotas, proportional_quotas
from ..extent import estimate_extent
from .measures import Measure, average, run_algo
from .table1 import dataset_suite

# the paper's Table II rows: (dataset, grouping, eps)
CONFIGS = [
    ("Adult", "sex", 0.1), ("Adult", "race", 0.1), ("Adult", "sex+race", 0.1),
    ("CelebA", "sex", 0.1), ("CelebA", "age", 0.1), ("CelebA", "sex+age", 0.1),
    ("Census", "sex", 0.1), ("Census", "age", 0.1), ("Census", "sex+age", 0.1),
    ("Lyrics", "genre", 0.05),
]


def algos_for(m: int) -> list[str]:
    """Applicable algorithms per Table II (FairSwap/SFDM1 need m = 2)."""
    if m == 2:
        return ["GMM", "FairSwap", "FairFlow", "SFDM1", "SFDM2"]
    return ["GMM", "FairFlow", "SFDM2"]


def run_table2(
    *,
    k: int = 20,
    runs: int = 1,
    scale: float = 1.0,
    quota: str = "equal",
    configs=None,
    progress=None,
) -> pd.DataFrame:
    """Measured Table II; one output row per (dataset, grouping, algorithm)."""
    suite = {name: (build, groupings) for name, build, groupings in dataset_suite(scale)}
    rows = []
    for dataset, grouping, eps in (configs or CONFIGS):
        build, _ = suite[dataset]
        ds = build(grouping)
        ks = (
            equal_quotas(k, ds.groups)
            if quota == "equal"
            else proportional_quotas(k, ds.groups)
        )
        ks = clamp_quotas(ks, ds.groups)  # no-op at full scale
        extent = estimate_extent(ds.feats, ds.metric)
        for algo in algos_for(ds.m):
            ms: list[Measure] = []
            for r in range(runs):
                ms.append(run_algo(algo, ds, ks, eps=eps, seed=r, extent=extent))
            avg = average(ms)
            if progress:
                progress(
                    f"{dataset}/{grouping} m={ds.m} {algo}: div={avg.diversity:.4f} "
                    f"time={avg.time_s:.3f}s stream={avg.stream_s:.2f}s "
                    f"elems={avg.n_elem:.1f}"
                )
            rows.append(
                {
                    "dataset": dataset,
                    "grouping": grouping,
                    "m": ds.m,
                    "n": ds.n,
                    "algo": algo,
                    "diversity": avg.diversity,
                    "time_s": avg.time_s,
                    "stream_s": avg.stream_s,
                    "update_us": avg.update_us,
                    "n_elem": avg.n_elem,
                }
            )
    return pd.DataFrame(rows)


def format_table2(df: pd.DataFrame) -> str:
    """Paper-style pivot: one row per dataset/grouping, algorithms as columns."""
    out = []
    for (dataset, grouping), sub in df.groupby(["dataset", "grouping"], sort=False):
        m = int(sub["m"].iloc[0])
        cells = [f"{dataset:<7} {grouping:<9} m={m:<3}"]
        for _, r in sub.iterrows():
            cell = f"{r['algo']}: div={r['diversity']:.4f} t={r['time_s']:.3f}s"
            if r["algo"] in ("SFDM1", "SFDM2"):
                cell += f" #elem={r['n_elem']:.1f}"
            cells.append(cell)
        out.append(" | ".join(cells))
    return "\n".join(out)
