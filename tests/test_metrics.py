"""Metric substrate: axioms, known values, vectorized-form consistency."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.metrics import METRICS, get_metric

VEC = st.lists(
    st.floats(min_value=-50, max_value=50, allow_nan=False), min_size=3, max_size=3
)
POSVEC = st.lists(
    st.floats(min_value=0.01, max_value=50, allow_nan=False), min_size=3, max_size=3
)


@pytest.mark.parametrize("name", METRICS)
def test_known_metric_lookup(name):
    assert get_metric(name).name == name


def test_unknown_metric_rejected():
    with pytest.raises(ValueError):
        get_metric("cosine")


def test_euclidean_known_value():
    m = get_metric("euclidean")
    D = m.pairwise(np.array([[0.0, 0.0]]), np.array([[3.0, 4.0]]))
    assert D[0, 0] == pytest.approx(5.0)


def test_manhattan_known_value():
    m = get_metric("manhattan")
    D = m.pairwise(np.array([[1.0, 2.0]]), np.array([[4.0, -2.0]]))
    assert D[0, 0] == pytest.approx(7.0)


def test_angular_known_values():
    m = get_metric("angular")
    a = np.array([[1.0, 0.0]])
    b = np.array([[0.0, 1.0]])
    assert m.pairwise(a, b)[0, 0] == pytest.approx(np.pi / 2)
    assert m.pairwise(a, 2 * a)[0, 0] == pytest.approx(0.0, abs=1e-7)
    assert m.pairwise(a, -a)[0, 0] == pytest.approx(np.pi)


@pytest.mark.parametrize("name", METRICS)
def test_self_distance_zero(name):
    m = get_metric(name)
    X = np.random.default_rng(0).random((5, 4)) + 0.1
    D = m.pairwise(X, X)
    assert np.allclose(np.diag(D), 0.0, atol=1e-6)


@pytest.mark.parametrize("name", METRICS)
def test_symmetry(name):
    m = get_metric(name)
    g = np.random.default_rng(1)
    A, B = g.random((6, 5)) + 0.1, g.random((7, 5)) + 0.1
    assert np.allclose(m.pairwise(A, B), m.pairwise(B, A).T, atol=1e-9)


@pytest.mark.parametrize("name", METRICS)
def test_nonnegative(name):
    m = get_metric(name)
    g = np.random.default_rng(2)
    A = g.normal(size=(10, 4)) if name != "angular" else g.random((10, 4)) + 0.01
    assert (m.pairwise(A, A) >= 0).all()


@pytest.mark.parametrize("name", METRICS)
def test_point_to_rows_matches_pairwise(name):
    m = get_metric(name)
    g = np.random.default_rng(3)
    A = g.random((8, 6)) + 0.1
    x = g.random(6) + 0.1
    assert np.allclose(m.point_to_rows(x, A), m.pairwise(x[None, :], A)[0], atol=1e-9)


@pytest.mark.parametrize("name", METRICS)
def test_point_to_rows_empty(name):
    m = get_metric(name)
    assert m.point_to_rows(np.ones(3), np.zeros((0, 3))).shape == (0,)


@settings(max_examples=40, deadline=None)
@given(x=VEC, y=VEC, z=VEC)
def test_triangle_inequality_euclidean(x, y, z):
    m = get_metric("euclidean")
    X = np.array([x, y, z])
    D = m.pairwise(X, X)
    assert D[0, 2] <= D[0, 1] + D[1, 2] + 1e-7


@settings(max_examples=40, deadline=None)
@given(x=VEC, y=VEC, z=VEC)
def test_triangle_inequality_manhattan(x, y, z):
    m = get_metric("manhattan")
    X = np.array([x, y, z])
    D = m.pairwise(X, X)
    assert D[0, 2] <= D[0, 1] + D[1, 2] + 1e-7


@settings(max_examples=40, deadline=None)
@given(x=POSVEC, y=POSVEC, z=POSVEC)
def test_triangle_inequality_angular(x, y, z):
    # angular distance is the geodesic on the sphere: a true metric
    m = get_metric("angular")
    X = np.array([x, y, z])
    D = m.pairwise(X, X)
    assert D[0, 2] <= D[0, 1] + D[1, 2] + 1e-6


def test_angular_nonneg_orthant_bounded_by_half_pi():
    # the paper's Lyrics remark: nonnegative vectors are within pi/2
    g = np.random.default_rng(4)
    A = g.random((20, 10)) + 1e-3
    m = get_metric("angular")
    assert m.pairwise(A, A).max() <= np.pi / 2 + 1e-9


def test_angular_zero_vector_guard():
    m = get_metric("angular")
    D = m.pairwise(np.zeros((1, 3)), np.ones((1, 3)))
    assert np.isfinite(D).all()


def test_euclidean_clip_no_nan_on_near_duplicates():
    m = get_metric("euclidean")
    X = np.full((2, 4), 0.123456789)
    assert not np.isnan(m.pairwise(X, X)).any()
