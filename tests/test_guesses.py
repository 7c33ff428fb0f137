"""Guess grid U: geometric structure, coverage, guards."""
import numpy as np
import pytest

from repro.guesses import MAX_GUESSES, guess_grid


def test_grid_starts_at_dmin():
    mus = guess_grid(1.0, 10.0, 0.1)
    assert mus[0] == pytest.approx(1.0)


def test_grid_ascending_geometric():
    mus = guess_grid(0.5, 50.0, 0.2)
    ratios = mus[1:] / mus[:-1]
    assert np.allclose(ratios, 1 / 0.8)
    assert (np.diff(mus) > 0).all()


def test_grid_within_bounds():
    mus = guess_grid(2.0, 17.0, 0.15)
    assert mus.min() >= 2.0
    assert mus.max() <= 17.0 * (1 + 1e-9)


@pytest.mark.parametrize("eps", [0.05, 0.1, 0.25])
def test_grid_covers_range_within_factor(eps):
    # every value in [d_min, d_max] has a grid point within factor (1-eps)
    mus = guess_grid(1.0, 100.0, eps)
    for target in np.geomspace(1.0, 100.0, 37):
        below = mus[mus <= target * (1 + 1e-12)]
        assert len(below) and below.max() >= target * (1 - eps) * (1 - 1e-12)


def test_grid_size_scales_inverse_eps():
    n1 = len(guess_grid(1.0, 1000.0, 0.05))
    n2 = len(guess_grid(1.0, 1000.0, 0.1))
    assert n1 > n2 > 1


def test_degenerate_single_point_range():
    mus = guess_grid(3.0, 3.0, 0.1)
    assert len(mus) == 1 and mus[0] == pytest.approx(3.0)


@pytest.mark.parametrize("eps", [0.0, 1.0, -0.5, 2.0])
def test_bad_eps_rejected(eps):
    with pytest.raises(ValueError):
        guess_grid(1.0, 2.0, eps)


@pytest.mark.parametrize("dmin,dmax", [(0.0, 1.0), (-1.0, 1.0), (2.0, 1.0)])
def test_bad_extent_rejected(dmin, dmax):
    with pytest.raises(ValueError):
        guess_grid(dmin, dmax, 0.1)


def test_oversized_grid_rejected():
    with pytest.raises(ValueError, match="coarsen"):
        guess_grid(1e-300, 1e300, 0.01)


def test_max_guesses_is_reasonable():
    assert 64 <= MAX_GUESSES <= 4096
