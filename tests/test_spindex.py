"""Tests for the sp-index builder (Section 5.2, Eqs. 11-12)."""
import numpy as np
import pandas as pd
import pytest

from repro.spindex.builder import SpIndex, _power_law_sizes, build_sp_index, z_order


@pytest.mark.parametrize("n_side,m", [(4, 1), (4, 2), (8, 3), (16, 4), (10, 2)])
@pytest.mark.parametrize("a,b", [(1.0, 1.0), (2.0, 2.0), (1.5, 2.0)])
def test_build_shapes(n_side, m, a, b):
    sp = build_sp_index(n_side, m, a, b)
    assert sp.m == m
    assert sp.n_base == n_side * n_side
    # level m = base units, one unit each.
    assert sp.level_width(m) == sp.n_base
    lvl_m = sp.units[sp.units.level == m]
    assert (lvl_m["size"] == 1).all()
    # widths non-decreasing with level.
    assert all(sp.widths[i] <= sp.widths[i + 1] for i in range(m - 1))


@pytest.mark.parametrize("n_side,m", [(8, 3), (16, 4)])
def test_mapping_partitions_each_level(n_side, m):
    sp = build_sp_index(n_side, m)
    for level in range(1, m + 1):
        sub = sp.mapping[sp.mapping.level == level]
        # every base unit mapped exactly once per level
        assert sorted(sub.base_unit) == list(range(sp.n_base))
        # number of distinct units at the level matches the width
        assert sub.unit.nunique() == sp.level_width(level)


@pytest.mark.parametrize("n_side,m", [(8, 3), (16, 4), (4, 2)])
def test_nesting(n_side, m):
    """Same level-(l+1) unit => same level-l ancestor (tree property)."""
    sp = build_sp_index(n_side, m)
    piv = sp.mapping.pivot(index="base_unit", columns="level", values="unit")
    for level in range(1, m):
        grouped = piv.groupby(level + 1)[level].nunique()
        assert (grouped == 1).all()


def test_unit_sizes_consistent():
    sp = build_sp_index(8, 3)
    counted = (
        sp.mapping.groupby(["level", "unit"]).size().rename("cnt").reset_index()
    )
    merged = counted.merge(sp.units, on=["level", "unit"])
    assert (merged.cnt == merged["size"]).all()


def test_parents_recorded():
    sp = build_sp_index(8, 3)
    piv = sp.mapping.pivot(index="base_unit", columns="level", values="unit")
    parent_of = dict(zip(sp.units.unit, sp.units.parent))
    for level in range(2, sp.m + 1):
        for bu in range(sp.n_base):
            assert parent_of[piv.loc[bu, level]] == piv.loc[bu, level - 1]
    for u in sp.units[sp.units.level == 1].unit:
        assert parent_of[u] == -1


@pytest.mark.parametrize("total,parts,b", [(10, 3, 2.0), (100, 7, 1.0), (5, 5, 2.0), (64, 8, 0.0)])
def test_power_law_sizes(total, parts, b):
    sizes = _power_law_sizes(total, parts, b)
    assert sizes.sum() == total
    assert (sizes >= 1).all()
    if b > 0 and total > 3 * parts:
        assert sizes[-1] >= sizes[0]  # later index => larger ∝ i^b


def test_power_law_width_follows_eq11():
    n_side, m, a = 16, 4, 2.0
    sp = build_sp_index(n_side, m, a=a)
    q = sp.n_base / m**a
    for level in range(1, m):
        assert sp.widths[level - 1] == int(round(q * level**a))


def test_z_order_bijective():
    n = 16
    ids = np.arange(n * n)
    codes = z_order(ids % n, ids // n)
    assert len(np.unique(codes)) == n * n


def test_z_order_locality():
    """Adjacent Z-codes are spatially close on average (vs random order)."""
    n = 16
    ids = np.arange(n * n)
    xs, ys = ids % n, ids // n
    order = np.argsort(z_order(xs, ys))
    dist = np.abs(np.diff(xs[order])) + np.abs(np.diff(ys[order]))
    assert dist.mean() < 3.0


def test_ancestors_of():
    sp = build_sp_index(8, 3)
    path = sp.ancestors_of(5)
    assert len(path) == 3
    piv = sp.mapping[sp.mapping.base_unit == 5].sort_values("level")
    assert path == piv.unit.tolist()


def test_deterministic():
    a = build_sp_index(8, 3)
    b = build_sp_index(8, 3)
    pd.testing.assert_frame_equal(a.mapping, b.mapping)
    pd.testing.assert_frame_equal(a.units, b.units)


def test_m1_single_level():
    sp = build_sp_index(4, 1)
    assert sp.widths == [16]
    assert (sp.mapping.level == 1).all()


def test_invalid_m():
    with pytest.raises(ValueError):
        build_sp_index(4, 0)


def test_density_skew_increases_with_b():
    flat = build_sp_index(16, 3, b=0.0)
    skew = build_sp_index(16, 3, b=2.0)
    s_flat = flat.units[flat.units.level == 1]["size"]
    s_skew = skew.units[skew.units.level == 1]["size"]
    assert s_skew.max() - s_skew.min() >= s_flat.max() - s_flat.min()
