"""Tests for the hierarchical IM trace generator (Section 5)."""
import numpy as np
import pandas as pd
import pytest

from repro.mobility.im_model import (
    IMParams,
    REALSIM_PARAMS,
    _power_law_int,
    generate_traces_pdf,
    group_assignment,
)
from repro.spindex.builder import build_sp_index


@pytest.fixture(scope="module")
def sp():
    return build_sp_index(12, 3)


def test_schema_and_bounds(sp):
    pdf = generate_traces_pdf(sp, 40, 48, seed=1)
    assert set(pdf.columns) == {"entity", "t", "base_unit"}
    assert pdf.t.between(0, 47).all()
    assert pdf.base_unit.between(0, sp.n_base - 1).all()
    assert pdf.entity.between(0, 39).all()


def test_deterministic(sp):
    a = generate_traces_pdf(sp, 30, 48, seed=3)
    b = generate_traces_pdf(sp, 30, 48, seed=3)
    pd.testing.assert_frame_equal(
        a.sort_values(list(a.columns), ignore_index=True),
        b.sort_values(list(b.columns), ignore_index=True),
    )


def test_seed_changes_data(sp):
    a = generate_traces_pdf(sp, 30, 48, seed=3)
    b = generate_traces_pdf(sp, 30, 48, seed=4)
    assert not a.equals(b)


def test_every_entity_present(sp):
    pdf = generate_traces_pdf(sp, 50, 48, seed=5)
    assert pdf.entity.nunique() == 50


def test_no_duplicate_detections(sp):
    pdf = generate_traces_pdf(sp, 30, 48, seed=6)
    assert not pdf.duplicated().any()


def test_one_place_at_a_time(sp):
    """An entity is in at most one base unit per time unit."""
    pdf = generate_traces_pdf(sp, 40, 60, seed=7)
    per_t = pdf.groupby(["entity", "t"]).base_unit.nunique()
    assert (per_t == 1).all()


@pytest.mark.parametrize("exponent", [0.5, 0.8, 1.5])
def test_power_law_int_range(exponent):
    rng = np.random.default_rng(0)
    xs = [_power_law_int(rng, exponent, 100) for _ in range(2000)]
    assert min(xs) >= 1 and max(xs) <= 100
    # heavier tail for smaller exponent
    assert np.mean(xs) > 1.0


def test_power_law_tail_ordering():
    rng1, rng2 = np.random.default_rng(0), np.random.default_rng(0)
    light = np.mean([_power_law_int(rng1, 2.0, 1000) for _ in range(4000)])
    heavy = np.mean([_power_law_int(rng2, 0.5, 1000) for _ in range(4000)])
    assert heavy > light


def test_group_assignment_partition():
    gids = group_assignment(100, (0.65, 0.2, 0.1, 0.05), seed=0)
    assert len(gids) == 100
    # contiguous non-decreasing group ids
    assert (np.diff(gids) >= 0).all()
    sizes = np.bincount(gids)
    assert sizes.max() <= 4 and sizes.min() >= 1


def test_group_members_are_associated(sp):
    """Co-movement: group members share far more cells than strangers."""
    p = IMParams(activity_skew=0.3)  # high activity so overlap is visible
    pdf = generate_traces_pdf(sp, 60, 96, params=p, seed=11)
    gids = group_assignment(60, p.group_probs, 11, p.group_sizes)
    cells = pdf.assign(cell=pdf.t * 10_000 + pdf.base_unit)
    by_e = {e: set(g.cell) for e, g in cells.groupby("entity")}

    def dice(a, b):
        return 2 * len(by_e[a] & by_e[b]) / (len(by_e[a]) + len(by_e[b]))

    pair_scores, stranger_scores = [], []
    groups = pd.Series(np.arange(60)).groupby(gids).apply(list)
    multi = [g for g in groups if len(g) >= 2]
    singles = [g[0] for g in groups if len(g) == 1]
    for g in multi[:10]:
        pair_scores.append(dice(g[0], g[1]))
    for i in range(min(10, len(singles) - 1)):
        stranger_scores.append(dice(singles[i], singles[i + 1]))
    assert np.mean(pair_scores) > 3 * max(np.mean(stranger_scores), 0.02)


def test_activity_skew_produces_heavy_tail(sp):
    pdf = generate_traces_pdf(sp, 120, 96, params=IMParams(activity_skew=2.5), seed=8)
    counts = pdf.groupby("entity").size()
    assert counts.median() < counts.mean()  # right-skewed
    assert counts.min() >= 1


def test_locality_increases_with_alpha(sp):
    """Eq. 7: larger α => shorter jumps => smaller spatial spread."""

    def spread(pdf):
        xs = pdf.base_unit % sp.n_side
        ys = pdf.base_unit // sp.n_side
        per = pdf.assign(x=xs, y=ys).groupby("entity").agg(
            sx=("x", "std"), sy=("y", "std")
        )
        return float((per.sx.fillna(0) + per.sy.fillna(0)).mean())

    lo = generate_traces_pdf(sp, 80, 96, params=IMParams(alpha=0.2, activity_skew=0.0), seed=9)
    hi = generate_traces_pdf(sp, 80, 96, params=IMParams(alpha=1.5, activity_skew=0.0), seed=9)
    assert spread(hi) < spread(lo)


def test_exploration_decreases_with_gamma(sp):
    """Eq. 6: larger γ => fewer exploratory jumps => fewer distinct units."""
    lo = generate_traces_pdf(sp, 80, 96, params=IMParams(gamma=0.0, activity_skew=0.0), seed=10)
    hi = generate_traces_pdf(sp, 80, 96, params=IMParams(gamma=1.5, activity_skew=0.0), seed=10)
    assert (
        hi.groupby("entity").base_unit.nunique().mean()
        <= lo.groupby("entity").base_unit.nunique().mean()
    )


def test_visits_concentrate_with_zeta(sp):
    """Eq. 8: larger ζ concentrates visits on top-ranked units."""
    p_lo = IMParams(zeta=0.2, rho=0.3, activity_skew=0.0)
    p_hi = IMParams(zeta=2.5, rho=0.3, activity_skew=0.0)
    lo = generate_traces_pdf(sp, 60, 120, params=p_lo, seed=12)
    hi = generate_traces_pdf(sp, 60, 120, params=p_hi, seed=12)

    def top_share(pdf):
        shares = []
        for _, g in pdf.groupby("entity"):
            vc = g.base_unit.value_counts(normalize=True)
            shares.append(vc.iloc[0])
        return np.mean(shares)

    assert top_share(hi) >= top_share(lo) - 0.05


def test_realsim_hotspots_heavy_tailed(sp):
    """REALSIM: unit visit volume is more skewed than the normal regime."""
    normal = generate_traces_pdf(sp, 150, 96, params=IMParams(), seed=13)
    real = generate_traces_pdf(sp, 150, 96, params=REALSIM_PARAMS, seed=13)

    def gini_ish(pdf):
        vc = pdf.base_unit.value_counts(normalize=True).to_numpy()
        return float((vc**2).sum())  # Herfindahl index

    assert gini_ish(real) > gini_ish(normal)


def test_spark_matches_pandas(spark):
    sp = build_sp_index(8, 2)
    from repro.mobility.im_model import generate_traces

    sdf = generate_traces(spark, sp, 25, 48, seed=21).toPandas()
    pdf = generate_traces_pdf(sp, 25, 48, seed=21)
    key = ["entity", "t", "base_unit"]
    pd.testing.assert_frame_equal(
        sdf.sort_values(key, ignore_index=True)[key].astype("int64"),
        pdf.sort_values(key, ignore_index=True)[key].astype("int64"),
    )
