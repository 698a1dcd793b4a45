"""Analytical pruning-effectiveness model — Section 5.3, Eqs. 16-19.

Predicts the Def.-5.1 pruning effectiveness (fraction of extra entities
checked; lower is better) from: hash domain size ``n*t``, the typical
ST-cell set size ``|seq^m|``, the number of hash functions ``n_h``, and
``n_c`` — the minimum number of shared cells an entity needs to beat the
expected k-th association degree ``d_e``.

Eq. 16 in the paper is the pmf of the minimum of ``|seq|`` i.i.d. uniform
hash values written as a sum over the number of cells attaining the min;
we compute the same distribution through the exact survival form
``P(min >= i) = ((D - i)/D)^{|seq|}``, which is the closed form of that
sum. Eq. 17 is the max over ``n_h`` routing candidates (computed through
the CDF power). Eqs. 18-19 are implemented as stated.
"""
from __future__ import annotations

import numpy as np


def sig_min_pmf(domain: int, seq_len: int) -> np.ndarray:
    """pmf of ``sig^m[u] = i`` over ``i in [0, domain)`` (Eq. 16)."""
    i = np.arange(domain + 1, dtype=np.float64)
    surv = ((domain - i) / domain) ** seq_len  # P(min >= i)
    pmf = surv[:-1] - surv[1:]
    return pmf / pmf.sum()


def routing_value_pmf(domain: int, seq_len: int, n_h: int) -> np.ndarray:
    """pmf of the node value at the routing index, max of n_h mins (Eq. 17)."""
    pmf = sig_min_pmf(domain, seq_len)
    cdf = np.cumsum(pmf)
    cdf_max = cdf**n_h  # P(max of n_h i.i.d. mins <= i)
    out = np.diff(np.concatenate([[0.0], cdf_max]))
    return out / out.sum()


def survive_prob(domain: int, seq_len: int, n_c: int, threshold: np.ndarray) -> np.ndarray:
    """Eq. 18: P(>= n_c of the query's cells survive a routing value R[j]).

    A query cell survives when its hash at the routing index is >= the
    node value; hashes are uniform on the domain.
    """
    thr = np.asarray(threshold, dtype=np.float64)
    p_surv = np.clip((domain - 1 - thr) / (domain - 1), 0.0, 1.0)
    # Binomial tail P(X >= n_c), X ~ Bin(seq_len, p_surv), vectorized.
    ks = np.arange(0, seq_len + 1)
    from math import comb

    c = np.array([comb(seq_len, int(x)) for x in ks], dtype=np.float64)
    out = np.zeros_like(p_surv)
    for j, p in np.ndenumerate(p_surv):
        terms = c[n_c:] * p ** ks[n_c:] * (1 - p) ** (seq_len - ks[n_c:])
        out[j] = terms.sum()
    return out


def predicted_pe(
    domain: int, seq_len: int, n_h: int, n_c: int, n_ranges: int = 64
) -> float:
    """Eq. 19: expected fraction of leaves that cannot be discarded."""
    if n_c <= 0:
        return 1.0
    pmf = routing_value_pmf(domain, seq_len, n_h)
    edges = np.linspace(0, domain, n_ranges + 1).astype(int)
    v = np.array(
        [pmf[edges[j] : edges[j + 1]].sum() for j in range(n_ranges)]
    )
    reps = np.array(
        [(edges[j] + max(edges[j + 1] - 1, edges[j])) / 2 for j in range(n_ranges)]
    )
    q = survive_prob(domain, seq_len, n_c, reps)
    return float(np.clip((v * q).sum(), 0.0, 1.0))


def n_c_from_expected_degree(
    d_e: float, seq_len: int, m: int, u: float, v: float
) -> int:
    """Smallest shared-cell count consistent with association degree d_e.

    Inverts the single-level term of Eq. 20 at the finest level (the term
    the signature actually encodes, §6.5): solve
    ``m^u (x/(x+seq_len))^v / max >= d_e`` for integer x.
    """
    from repro.core.adm import ADMParams

    params = ADMParams(m=m, u=u, v=v)
    target = d_e * params.max_norm / (m**u)
    if target <= 0:
        return 1
    ratio = min(target ** (1.0 / v), 0.999999)
    x = ratio * seq_len / (1.0 - ratio)
    return max(1, int(np.ceil(x)))
