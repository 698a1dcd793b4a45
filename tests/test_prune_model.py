"""Tests for the analytical PE model (Section 5.3, Eqs. 16-19)."""
import numpy as np
import pytest

from repro.core.prune_model import (
    n_c_from_expected_degree,
    predicted_pe,
    routing_value_pmf,
    sig_min_pmf,
    survive_prob,
)


@pytest.mark.parametrize("domain,seq_len", [(50, 3), (200, 10), (1000, 40)])
def test_sig_min_pmf_is_distribution(domain, seq_len):
    pmf = sig_min_pmf(domain, seq_len)
    assert pmf.shape == (domain,)
    assert pmf.min() >= 0
    assert pmf.sum() == pytest.approx(1.0)


def test_sig_min_concentrates_low_for_large_sets():
    """More cells => smaller minimum hash (mass shifts to low values)."""
    small = sig_min_pmf(100, 2)
    large = sig_min_pmf(100, 30)
    mean_small = (np.arange(100) * small).sum()
    mean_large = (np.arange(100) * large).sum()
    assert mean_large < mean_small


@pytest.mark.parametrize("n_h", [1, 8, 64])
def test_routing_value_pmf_is_distribution(n_h):
    pmf = routing_value_pmf(100, 5, n_h)
    assert pmf.sum() == pytest.approx(1.0)
    assert (pmf >= -1e-15).all()


def test_routing_value_grows_with_nh():
    """Eq. 17: the max over more hash functions is stochastically larger."""
    means = []
    for n_h in (1, 16, 256):
        pmf = routing_value_pmf(200, 8, n_h)
        means.append((np.arange(200) * pmf).sum())
    assert means[0] < means[1] < means[2]


def test_routing_nh1_equals_min_pmf():
    np.testing.assert_allclose(
        routing_value_pmf(80, 6, 1), sig_min_pmf(80, 6), atol=1e-12
    )


def test_survive_prob_monotone_in_threshold():
    """Eq. 18: a larger node value prunes more => lower survival prob."""
    thr = np.array([0, 20, 50, 90])
    q = survive_prob(100, 10, 3, thr)
    assert (np.diff(q) <= 1e-12).all()
    assert q[0] == pytest.approx(1.0)


def test_survive_prob_monotone_in_nc():
    thr = np.array([40.0])
    qs = [survive_prob(100, 10, nc, thr)[0] for nc in (1, 3, 6, 10)]
    assert all(qs[i] >= qs[i + 1] - 1e-12 for i in range(3))


@pytest.mark.parametrize("n_c", [1, 3])
def test_predicted_pe_range(n_c):
    pe = predicted_pe(500, 12, 64, n_c)
    assert 0.0 <= pe <= 1.0


def test_predicted_pe_decreases_with_nh():
    """Fig. 2's predicted curve: more hash functions => better pruning."""
    pes = [predicted_pe(2000, 10, n_h, 6) for n_h in (4, 64, 1024)]
    assert pes[0] >= pes[1] >= pes[2]


def test_predicted_pe_saturates():
    """Diminishing returns per doubling at very large n_h (§6.3)."""
    gain_early = predicted_pe(2000, 10, 1 << 2, 6) - predicted_pe(2000, 10, 1 << 6, 6)
    gain_late = predicted_pe(2000, 10, 1 << 12, 6) - predicted_pe(2000, 10, 1 << 16, 6)
    assert gain_late < gain_early


def test_predicted_pe_easier_with_higher_nc():
    """Queries needing more shared cells are easier to prune."""
    lo = predicted_pe(1000, 12, 128, 2)
    hi = predicted_pe(1000, 12, 128, 9)
    assert hi <= lo + 1e-12


def test_nc_zero_gives_pe_one():
    assert predicted_pe(100, 5, 8, 0) == 1.0


def test_n_c_from_expected_degree():
    nc = n_c_from_expected_degree(0.5, seq_len=20, m=3, u=1.0, v=1.0)
    assert 1 <= nc <= 20
    # higher target degree needs more shared cells
    nc_hi = n_c_from_expected_degree(0.8, seq_len=20, m=3, u=1.0, v=1.0)
    assert nc_hi >= nc
    assert n_c_from_expected_degree(0.0, 20, 3, 1.0, 1.0) == 1
