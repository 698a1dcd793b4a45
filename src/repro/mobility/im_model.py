"""Hierarchical individual-mobility (IM) trace generator — Section 5.

Implements the paper's extension of the Song-et-al. exploration /
preferential-return model (Eqs. 5-10) on the base grid of an
:class:`~repro.spindex.builder.SpIndex`:

* dwell duration of each presence instance (PI): ``P(Δt) ∝ Δt^{-1-β}``
  (Eq. 5);
* on leaving, explore with probability ``ρ · S^{-γ}`` (Eq. 6) where ``S``
  is the number of distinct base units visited so far, else return;
* exploration displacement ``P(Δr) ∝ Δr^{-1-α}`` (Eq. 7), uniform angle,
  clipped to the grid;
* returns pick a previously visited unit with probability ``∝ rank^{-ζ}``
  by visit count (Eq. 8 enforced directly);
* between PIs the entity is unobserved for a geometric gap (digital
  traces are detections, not continuous tracking — the sparse WiFi-probe
  setting of the paper's REAL data).

Two population features make laptop-scale data behave like the paper's
at-scale data (both documented in DESIGN.md):

* **co-movement groups** — entities are partitioned into groups (most are
  singletons); group members share the leader's PIs with probability
  ``p_co`` and move independently otherwise. This supplies the closely
  associated entities (families, couples, co-located devices) that the
  paper's motivating applications query for and that its Fig.-10 degree
  distribution exhibits at 30M-100M-entity scale;
* **hotspots** (``REALSIM`` regime) — exploration mixes in a global Zipf
  popularity draw with probability ``p_hot``, modelling WiFi hotspots
  with heavy-tailed visit volume (App. C shape).

The generator is deterministic: group ``g`` uses ``default_rng`` seeded by
``(seed, g)`` regardless of how groups are partitioned across Spark tasks.
`generate_traces` distributes whole groups via ``mapInPandas``;
`generate_traces_pdf` is the identical single-process path.
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Iterator

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import types as T

TRACE_SCHEMA = T.StructType(
    [
        T.StructField("entity", T.LongType(), False),
        T.StructField("t", T.IntegerType(), False),
        T.StructField("base_unit", T.IntegerType(), False),
    ]
)


@dataclass(frozen=True)
class IMParams:
    """Mobility-model parameters (defaults = the paper's 'normal' pattern)."""

    alpha: float = 0.6  # jump-displacement exponent (Eq. 7)
    beta: float = 0.8  # dwell-duration exponent (Eq. 5)
    gamma: float = 0.2  # exploration decay (Eq. 6)
    zeta: float = 1.2  # return visit-frequency exponent (Eq. 8)
    rho: float = 0.6  # exploration scale (Eq. 6)
    mean_gap: float = 3.0  # mean unobserved gap between PIs (time units)
    max_duration: int = 12  # cap on a single PI's dwell (time units)
    p_hot: float = 0.0  # REALSIM: prob. an exploration targets a hotspot
    hot_zipf: float = 1.0  # REALSIM: hotspot popularity Zipf exponent
    p_co: float = 0.6  # prob. a group member shares a leader PI
    #: co-movement group sizes and their sampling probabilities: most
    #: entities are alone or in couples/families, a tail of larger groups
    #: (co-workers, venue regulars) supplies rank-10..50 associates just as
    #: the paper's 30M-entity population does (App. C / Fig. 10).
    group_sizes: tuple[int, ...] = (1, 2, 3, 4, 12, 24)
    group_probs: tuple[float, ...] = (0.55, 0.2, 0.1, 0.05, 0.06, 0.04)
    activity_skew: float = 2.5  # per-entity duty cycle q_e = U^skew (heavy tail)


#: Parameter regime standing in for the paper's proprietary REAL dataset.
REALSIM_PARAMS = IMParams(alpha=0.8, zeta=1.5, rho=0.5, p_hot=0.3, hot_zipf=1.2)


def _power_law_int(rng: np.random.Generator, exponent: float, cap: int) -> int:
    """Draw an integer >= 1 with P(x) ∝ x^{-1-exponent}, capped."""
    u = rng.random()
    x = int(np.ceil((1.0 - u) ** (-1.0 / max(exponent, 1e-6))) - 1e-9)
    return min(max(x, 1), cap)


def _walk_pis(
    rng: np.random.Generator,
    n_side: int,
    t_max: int,
    p: IMParams,
    hot_perm: np.ndarray | None,
    start: tuple[int, int] | None = None,
) -> list[tuple[int, int, int]]:
    """One IM walk; returns presence instances ``(t_start, duration, unit)``."""
    n_base = n_side * n_side
    if start is None:
        x = int(rng.integers(0, n_side))
        y = int(rng.integers(0, n_side))
    else:
        x, y = start
    visits: dict[int, int] = {}
    pis: list[tuple[int, int, int]] = []
    t = int(rng.integers(0, max(1, int(p.mean_gap))))
    while t < t_max:
        unit = y * n_side + x
        visits[unit] = visits.get(unit, 0) + 1
        dur = _power_law_int(rng, p.beta, p.max_duration)
        dur = min(dur, t_max - t)
        pis.append((t, dur, unit))
        t += dur + rng.geometric(1.0 / max(p.mean_gap, 1.0))
        # Jump decision (Eq. 6).
        if rng.random() < p.rho * len(visits) ** (-p.gamma):
            if hot_perm is not None and rng.random() < p.p_hot:
                rank = _power_law_int(rng, p.hot_zipf, n_base) - 1
                unit_new = int(hot_perm[rank])
                x, y = unit_new % n_side, unit_new // n_side
            else:
                dr = _power_law_int(rng, p.alpha, 2 * n_side)
                ang = rng.random() * 2 * np.pi
                x = int(np.clip(round(x + dr * np.cos(ang)), 0, n_side - 1))
                y = int(np.clip(round(y + dr * np.sin(ang)), 0, n_side - 1))
        else:
            # Preferential return, rank-based Zipf (Eq. 8).
            ranked = sorted(visits.items(), key=lambda kv: (-kv[1], kv[0]))
            ranks = np.arange(1, len(ranked) + 1, dtype=np.float64)
            w = ranks ** (-p.zeta)
            w /= w.sum()
            unit_new = ranked[int(rng.choice(len(ranked), p=w))][0]
            x, y = unit_new % n_side, unit_new // n_side
    return pis


def _expand(pis: list[tuple[int, int, int]], t_max: int) -> tuple[np.ndarray, np.ndarray]:
    ts, us = [], []
    for t0, dur, unit in pis:
        for dt in range(dur):
            if t0 + dt >= t_max:
                break
            ts.append(t0 + dt)
            us.append(unit)
    return np.asarray(ts, dtype=np.int64), np.asarray(us, dtype=np.int64)


def group_assignment(
    n_entities: int,
    probs: tuple[float, ...],
    seed: int,
    sizes: tuple[int, ...] | None = None,
) -> np.ndarray:
    """Deterministic entity -> group id partition with the given size pmf."""
    rng = np.random.default_rng(seed ^ 0xA11CE)
    size_choices = sizes if sizes is not None else tuple(range(1, len(probs) + 1))
    out_sizes = []
    total = 0
    while total < n_entities:
        s = int(
            size_choices[rng.choice(len(probs), p=np.asarray(probs) / sum(probs))]
        )
        s = min(s, n_entities - total)
        out_sizes.append(s)
        total += s
    return np.repeat(np.arange(len(out_sizes)), out_sizes)


def _thin(
    entity: int, ts: np.ndarray, us: np.ndarray, p: IMParams, seed: int
) -> tuple[np.ndarray, np.ndarray]:
    """Keep each detection with the entity's duty cycle ``q_e = U^skew``.

    Digital-trace detection counts are heavy-tailed across devices (most
    are observed rarely, a few near-continuously); ``q_e`` is drawn per
    entity and each detection row is kept i.i.d. with probability
    ``q_e``, always retaining at least one row.
    """
    if not len(ts):
        return ts, us
    rng = np.random.default_rng([seed ^ 0xAC71, int(entity)])
    q_e = rng.random() ** p.activity_skew
    keep = rng.random(len(ts)) < q_e
    if not keep.any():
        keep[rng.integers(0, len(ts))] = True
    return ts[keep], us[keep]


def _group_traces(
    gid: int,
    members: np.ndarray,
    n_side: int,
    t_max: int,
    p: IMParams,
    seed: int,
    hot_perm: np.ndarray | None,
) -> pd.DataFrame:
    """Traces for one co-movement group (leader + followers)."""
    rng = np.random.default_rng([seed, int(gid)])
    leader_pis = _walk_pis(rng, n_side, t_max, p, hot_perm)
    frames = []
    lt, lu = _thin(int(members[0]), *_expand(leader_pis, t_max), p, seed)
    frames.append(pd.DataFrame({"entity": members[0], "t": lt, "base_unit": lu}))
    home = (leader_pis[0][2] % n_side, leader_pis[0][2] // n_side) if leader_pis else None
    for f in members[1:]:
        # Shared PIs are co-detections: the follower carries the leader's
        # *observed* rows for each shared PI (one WiFi probe sees both
        # devices), so thinning does not multiply across the pair.
        share_t0 = {pi[0] for pi in leader_pis if rng.random() < p.p_co}
        pi_start = {}
        for t0, dur, _ in leader_pis:
            for dt in range(dur):
                pi_start[t0 + dt] = t0
        sh_mask = np.array([pi_start.get(int(t)) in share_t0 for t in lt], bool)
        st, su = lt[sh_mask], lu[sh_mask]
        covered = set(st.tolist())
        ot, ou = _thin(
            int(f),
            *_expand(_walk_pis(rng, n_side, t_max, p, hot_perm, start=home), t_max),
            p,
            seed,
        )
        keep = ~np.isin(ot, list(covered)) if len(ot) else np.zeros(0, bool)
        frames.append(
            pd.DataFrame(
                {
                    "entity": f,
                    "t": np.concatenate([st, ot[keep]]),
                    "base_unit": np.concatenate([su, ou[keep]]),
                }
            )
        )
    out = pd.concat(frames, ignore_index=True)
    out["t"] = out["t"].astype("int32")
    out["base_unit"] = out["base_unit"].astype("int32")
    out["entity"] = out["entity"].astype("int64")
    return out.drop_duplicates(ignore_index=True)


def _hot_perm(n_base: int, p: IMParams, seed: int) -> np.ndarray | None:
    """Global hotspot-popularity permutation (same for every entity)."""
    if p.p_hot <= 0:
        return None
    return np.random.default_rng(seed ^ 0x5EED).permutation(n_base)


def generate_traces_pdf(
    sp_or_side,
    n_entities: int,
    t_max: int,
    params: IMParams | None = None,
    seed: int = 0,
) -> pd.DataFrame:
    """Pandas trace generation: rows ``(entity, t, base_unit)``, distinct."""
    p = params or IMParams()
    n_side = sp_or_side if isinstance(sp_or_side, int) else sp_or_side.n_side
    gids = group_assignment(n_entities, p.group_probs, seed, p.group_sizes)
    hp = _hot_perm(n_side * n_side, p, seed)
    ents = np.arange(n_entities)
    frames = [
        _group_traces(g, ents[gids == g], n_side, t_max, p, seed, hp)
        for g in np.unique(gids)
    ]
    return pd.concat(frames, ignore_index=True)


def generate_traces(
    spark: SparkSession,
    sp,
    n_entities: int,
    t_max: int,
    params: IMParams | None = None,
    seed: int = 0,
) -> DataFrame:
    """Spark-parallel trace generation (``mapInPandas`` over group ranges)."""
    p = params or IMParams()
    n_side = sp if isinstance(sp, int) else sp.n_side
    gids = group_assignment(n_entities, p.group_probs, seed, p.group_sizes)
    groups = pd.DataFrame({"entity": np.arange(n_entities), "gid": gids})

    def gen(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        hp = _hot_perm(n_side * n_side, p, seed)
        for b in batches:
            for g, grp in b.groupby("gid"):
                yield _group_traces(
                    int(g), grp.entity.to_numpy(), n_side, t_max, p, seed, hp
                )

    n_parts = min(spark.sparkContext.defaultParallelism * 2, max(1, len(groups) // 16))
    sdf = spark.createDataFrame(groups).repartition(n_parts, "gid")
    return sdf.mapInPandas(gen, schema=TRACE_SCHEMA)
