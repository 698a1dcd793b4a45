"""Rank-comparison metrics — Appendix D, Eqs. 21-22.

``kendall_tau_distance`` implements Eq. 22 (normalized by the number of
pairs ``n(n-1)/2``; the paper's ``n(n-2)/2`` denominator is a typo — it is
negative at n=1 and the text states identical lists score 0 and reversed
lists score 1, which only the standard pair count satisfies).

``k_avg`` implements Eq. 21's generalized top-k distance: each list is
extended with the other's missing elements (appended after the ranked
part, in a fixed order — the expectation over orders is approximated by
the canonical order, which leaves the metric's zero/identity behaviour
unchanged), then Kendall's tau distance is taken. ``ad_diff`` is the mean
absolute association-degree gap at equal ranks.
"""
from __future__ import annotations

from typing import Sequence

import numpy as np


def kendall_tau_distance(r1: Sequence, r2: Sequence) -> float:
    """Normalized Kendall's tau distance between two rankings (Eq. 22)."""
    if set(r1) != set(r2) or len(r1) != len(r2):
        raise ValueError("rankings must be permutations of the same elements")
    n = len(r1)
    if n < 2:
        return 0.0
    pos2 = {e: i for i, e in enumerate(r2)}
    mapped = np.array([pos2[e] for e in r1])
    disc = 0
    for i in range(n):
        disc += int(np.sum(mapped[i + 1 :] < mapped[i]))
    return disc / (n * (n - 1) / 2)


def k_avg(list_p: Sequence, list_q: Sequence) -> float:
    """Generalized top-k Kendall distance between two top-k lists (Eq. 21)."""
    p, q = list(list_p), list(list_q)
    sp_, sq = set(p), set(q)
    ext_p = p + [e for e in q if e not in sp_]
    ext_q = q + [e for e in p if e not in sq]
    return kendall_tau_distance(ext_p, ext_q)


def ad_diff(deg_p: Sequence[float], deg_q: Sequence[float]) -> float:
    """Mean |deg difference| at equal ranks (Eq. 21, ADDiff)."""
    a = np.asarray(deg_p, dtype=float)
    b = np.asarray(deg_q, dtype=float)
    if a.shape != b.shape:
        raise ValueError("degree lists must have equal length")
    if not len(a):
        return 0.0
    return float(np.abs(a - b).mean())
