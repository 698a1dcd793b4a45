"""Tests for the association degree measure (Eq. 20) and classic measures."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core.adm import (
    ADMParams,
    adm_score,
    weighted_cosine,
    weighted_dice,
    weighted_jaccard,
)


@pytest.mark.parametrize("m", [1, 2, 4])
@pytest.mark.parametrize("u,v", [(0.5, 0.5), (1.0, 1.0), (2.0, 2.0), (1.0, 1.2)])
def test_self_similarity_is_one(m, u, v):
    p = ADMParams(m=m, u=u, v=v)
    sz = np.full((1, m), 7.0)
    assert adm_score(p, sz, sz, sz)[0] == pytest.approx(1.0)


@pytest.mark.parametrize("m", [1, 3])
def test_zero_intersection_zero_score(m):
    p = ADMParams(m=m)
    z = np.zeros((1, m))
    sz = np.full((1, m), 5.0)
    assert adm_score(p, z, sz, sz)[0] == 0.0


@given(
    m=st.integers(1, 4),
    u=st.floats(0.1, 3.0),
    v=st.floats(0.3, 3.0),
    data=st.data(),
)
@settings(max_examples=60, deadline=None)
def test_range_and_monotonicity(m, u, v, data):
    """d in [0,1]; more intersection (duration) => no smaller d (§2.2)."""
    p = ADMParams(m=m, u=u, v=v)
    sz_a = np.array([data.draw(st.integers(1, 50)) for _ in range(m)], float)
    sz_b = np.array([data.draw(st.integers(1, 50)) for _ in range(m)], float)
    inter = np.array(
        [data.draw(st.integers(0, int(min(sz_a[i], sz_b[i])))) for i in range(m)],
        float,
    )
    d = adm_score(p, inter[None], sz_a[None], sz_b[None])[0]
    assert 0.0 <= d <= 1.0 + 1e-12
    # grow one level's intersection (still within bounds) -> d must not drop
    grow = inter.copy()
    lvl = data.draw(st.integers(0, m - 1))
    grow[lvl] = min(sz_a[lvl], sz_b[lvl])
    d2 = adm_score(p, grow[None], sz_a[None], sz_b[None])[0]
    assert d2 >= d - 1e-12


@given(m=st.integers(1, 4), data=st.data())
@settings(max_examples=40, deadline=None)
def test_smaller_candidate_scores_higher(m, data):
    """Constraint on G (§2.2): same overlap, smaller |P_b| => larger d."""
    p = ADMParams(m=m, u=1.0, v=1.0)
    sz_a = np.full(m, 20.0)
    inter = np.array([data.draw(st.integers(0, 10)) for _ in range(m)], float)
    sz_b = np.array([data.draw(st.integers(10, 30)) for _ in range(m)], float)
    sz_c = sz_b + data.draw(st.integers(1, 10))
    d_b = adm_score(p, inter[None], sz_a[None], sz_b[None])[0]
    d_c = adm_score(p, inter[None], sz_a[None], sz_c[None])[0]
    assert d_b >= d_c - 1e-12


def test_finer_level_weighs_more_with_u_positive():
    """An AjPI at a finer level contributes more (property of f, §2.2)."""
    p = ADMParams(m=2, u=1.0, v=1.0)
    sz = np.full((1, 2), 10.0)
    only_coarse = adm_score(p, np.array([[5.0, 0.0]]), sz, sz)[0]
    only_fine = adm_score(p, np.array([[0.0, 5.0]]), sz, sz)[0]
    assert only_fine > only_coarse


def test_adm_v1_equals_weighted_dice():
    """At v=1 the ADM is exactly the level-weighted Dice (App. D)."""
    m = 3
    p = ADMParams(m=m, u=1.0, v=1.0)
    rng = np.random.default_rng(0)
    sz_a = rng.integers(1, 30, (8, m)).astype(float)
    sz_b = rng.integers(1, 30, (8, m)).astype(float)
    inter = np.minimum(sz_a, sz_b) * rng.random((8, m))
    np.testing.assert_allclose(
        adm_score(p, inter, sz_a, sz_b), weighted_dice(inter, sz_a, sz_b, m)
    )


@pytest.mark.parametrize("fn", [weighted_dice, weighted_jaccard, weighted_cosine])
def test_classic_measures_range(fn):
    m = 3
    rng = np.random.default_rng(1)
    sz_a = rng.integers(1, 30, (16, m)).astype(float)
    sz_b = rng.integers(1, 30, (16, m)).astype(float)
    inter = np.floor(np.minimum(sz_a, sz_b) * rng.random((16, m)))
    vals = fn(inter, sz_a, sz_b, m)
    assert (vals >= -1e-12).all() and (vals <= 1 + 1e-12).all()
    ident = fn(sz_a, sz_a, sz_a, m)
    np.testing.assert_allclose(ident, 1.0)


def test_max_norm():
    p = ADMParams(m=4, u=2.0, v=1.5)
    w = np.arange(1, 5, dtype=float) ** 2.0
    assert p.max_norm == pytest.approx(float(w.sum() * 0.5**1.5))


def test_zero_sized_level_is_safe():
    """Entities with no cells at a level must not produce NaN."""
    p = ADMParams(m=2)
    d = adm_score(p, np.array([[0.0, 0.0]]), np.array([[0.0, 3.0]]), np.array([[0.0, 4.0]]))
    assert np.isfinite(d).all()
