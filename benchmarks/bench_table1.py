"""Benchmark for Table I — dataset stand-in generation throughput.

Regenerates every dataset used by the evaluation at a reduced n so the
generation cost (the substrate every other benchmark rests on) is tracked.
"""
import pytest

from repro.datasets import adult_like, blobs, celeba_like, census_like, lyrics_like

N = 20_000


@pytest.mark.parametrize(
    "name,build",
    [
        ("adult", lambda: adult_like(N, "sex+race")),
        ("celeba", lambda: celeba_like(N, "sex+age")),
        ("census", lambda: census_like(N, "sex+age")),
        ("lyrics", lambda: lyrics_like(N)),
        ("blobs", lambda: blobs(N, 10)),
    ],
)
def test_generate(benchmark, name, build):
    ds = benchmark.pedantic(build, rounds=3, iterations=1)
    assert ds.n == N
