"""Association degree measures — Eq. 20 and the App.-D classic measures.

With time discretized into unit cells, the total duration of level-``l``
AjPIs between two entities equals the number of shared level-``l``
ST-cells, so Eq. 20 becomes

``d(a, b) = Σ_l l^u · (|seq_a^l ∩ seq_b^l| / (|seq_a^l| + |seq_b^l|))^v / max``

with ``max = Σ_l l^u · (1/2)^v`` (attained at ``a = b``). At ``v = 1`` this
is exactly the level-weighted Dice similarity (App. D). All functions are
vectorized over numpy arrays shaped ``(n_pairs, m)``.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np


@dataclass(frozen=True)
class ADMParams:
    """Eq.-20 parameters: ``u`` weighs level, ``v`` weighs duration."""

    m: int
    u: float = 1.0
    v: float = 1.0

    @property
    def level_weights(self) -> np.ndarray:
        return np.arange(1, self.m + 1, dtype=np.float64) ** self.u

    @property
    def max_norm(self) -> float:
        return float(self.level_weights.sum() * 0.5**self.v)


def _ratios(inter: np.ndarray, sz_a: np.ndarray, sz_b: np.ndarray) -> np.ndarray:
    denom = sz_a + sz_b
    with np.errstate(invalid="ignore", divide="ignore"):
        r = np.where(denom > 0, inter / np.maximum(denom, 1), 0.0)
    return r


def adm_score(
    params: ADMParams, inter: np.ndarray, sz_a: np.ndarray, sz_b: np.ndarray
) -> np.ndarray:
    """Eq. 20 over per-level arrays of shape ``(..., m)`` -> ``(...,)``."""
    r = _ratios(np.asarray(inter, float), np.asarray(sz_a, float), np.asarray(sz_b, float))
    return (r**params.v @ params.level_weights) / params.max_norm


def weighted_dice(inter, sz_a, sz_b, m: int) -> np.ndarray:
    """Level-weighted Dice: Σ_l w_l · 2|∩|/(|A|+|B|), w_l = l/Σl (App. D)."""
    w = np.arange(1, m + 1, dtype=np.float64)
    w /= w.sum()
    return (2.0 * _ratios(np.asarray(inter, float), np.asarray(sz_a, float), np.asarray(sz_b, float))) @ w


def weighted_jaccard(inter, sz_a, sz_b, m: int) -> np.ndarray:
    """Level-weighted Jaccard: Σ_l w_l · |∩|/|A∪B|."""
    inter = np.asarray(inter, float)
    union = np.asarray(sz_a, float) + np.asarray(sz_b, float) - inter
    w = np.arange(1, m + 1, dtype=np.float64)
    w /= w.sum()
    with np.errstate(invalid="ignore", divide="ignore"):
        j = np.where(union > 0, inter / np.maximum(union, 1), 0.0)
    return j @ w


def weighted_cosine(inter, sz_a, sz_b, m: int) -> np.ndarray:
    """Level-weighted cosine: Σ_l w_l · |∩|/sqrt(|A||B|)."""
    inter = np.asarray(inter, float)
    prod = np.asarray(sz_a, float) * np.asarray(sz_b, float)
    w = np.arange(1, m + 1, dtype=np.float64)
    w /= w.sum()
    with np.errstate(invalid="ignore", divide="ignore"):
        c = np.where(prod > 0, inter / np.sqrt(np.maximum(prod, 1)), 0.0)
    return c @ w


CLASSIC_MEASURES = {
    "dice": weighted_dice,
    "jaccard": weighted_jaccard,
    "cosine": weighted_cosine,
}
