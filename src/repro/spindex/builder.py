"""Spatial-hierarchy (sp-index) construction — Section 5.2, Eqs. 11-12.

The area of interest is an ``n_side x n_side`` grid of base spatial units
(the paper's ``(L/L_bsu)^2`` cells). The sp-index is an ``m``-level tree
over those units:

* level ``m`` (finest) — the base units themselves;
* level ``l < m`` — ``W_l = round(Q * l^a)`` units (Eq. 11, with
  ``Q = n_base / m^a``), whose sizes at each level follow the power law
  ``D_l^i ∝ i^b`` (Eq. 12).

Units at each level partition the base grid. Nesting is obtained by a
top-down partition of the Z-order (Morton) sequence of base units: each
parent's contiguous Z-order range is split among its children, so children
ranges refine parent ranges and spatial locality is preserved — the paper
only requires non-overlapping same-level units with fixed parents.

Unit ids are globally unique across levels so a ``(t, unit)`` ST-cell can
be encoded as a single integer at any level.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np
import pandas as pd


def z_order(xs: np.ndarray, ys: np.ndarray, bits: int = 16) -> np.ndarray:
    """Morton code of integer grid coordinates (vectorized)."""
    code = np.zeros(xs.shape, dtype=np.int64)
    x = xs.astype(np.int64)
    y = ys.astype(np.int64)
    for b in range(bits):
        code |= ((x >> b) & 1) << (2 * b)
        code |= ((y >> b) & 1) << (2 * b + 1)
    return code


def _power_law_sizes(total: int, parts: int, b: float) -> np.ndarray:
    """Split ``total`` items into ``parts`` positive integer sizes ∝ i^b.

    Largest-remainder rounding; every part gets at least one item
    (requires ``parts <= total``).
    """
    i = np.arange(1, parts + 1, dtype=np.float64)
    w = i**b
    w /= w.sum()
    raw = w * (total - parts)  # reserve one item per part up front
    sizes = np.floor(raw).astype(np.int64) + 1
    rem = total - int(sizes.sum())
    order = np.argsort(-(raw - np.floor(raw)))
    sizes[order[:rem]] += 1
    assert sizes.sum() == total and (sizes >= 1).all()
    return sizes


@dataclass
class SpIndex:
    """A built sp-index.

    Attributes:
        m: number of levels (level 1 coarsest ... level m = base units).
        n_side: side of the base grid; ``n_base = n_side**2``.
        mapping: pandas DataFrame ``(base_unit, level, unit)`` giving, for
            every base unit, its ancestor unit id at every level (at level
            m the ancestor is the base unit's own global id).
        units: pandas DataFrame ``(unit, level, parent, size)`` — one row
            per spatial unit; ``parent`` is -1 for level-1 units; ``size``
            is the number of base units covered.
    """

    m: int
    n_side: int
    mapping: pd.DataFrame
    units: pd.DataFrame
    widths: list[int] = field(default_factory=list)

    @property
    def n_base(self) -> int:
        return self.n_side * self.n_side

    @property
    def n_units_total(self) -> int:
        return len(self.units)

    def level_width(self, level: int) -> int:
        return self.widths[level - 1]

    def ancestors_of(self, base_unit: int) -> list[int]:
        """Root-to-leaf path of unit ids for one base unit."""
        rows = self.mapping[self.mapping.base_unit == base_unit].sort_values("level")
        return rows.unit.tolist()


def build_sp_index(n_side: int, m: int, a: float = 2.0, b: float = 2.0) -> SpIndex:
    """Build an sp-index over an ``n_side x n_side`` grid (Eqs. 11-12).

    Widths are clamped to be non-decreasing with level and at most
    ``n_base``; level ``m`` always has exactly ``n_base`` units (the base
    units). Deterministic in its arguments.
    """
    if m < 1:
        raise ValueError("m must be >= 1")
    n_base = n_side * n_side
    q = n_base / (m**a)
    widths: list[int] = []
    prev = 1
    for level in range(1, m + 1):
        w = n_base if level == m else int(round(q * level**a))
        w = max(prev, min(w, n_base))
        widths.append(w)
        prev = w

    # Base units in Z-order: position p in the order -> base unit id.
    ids = np.arange(n_base)
    xs, ys = ids % n_side, ids // n_side
    order = np.argsort(z_order(xs, ys), kind="stable")
    base_in_z = ids[order]  # base_in_z[p] = base unit at Z-position p

    # Top-down nested partition of Z-positions. boundaries[l] is an int
    # array of segment end-offsets (exclusive) for level l+1.
    next_uid = 0
    unit_rows: list[tuple[int, int, int, int]] = []
    map_cols: list[np.ndarray] = []
    parent_bounds = np.array([n_base], dtype=np.int64)  # virtual root
    parent_uids = np.array([-1], dtype=np.int64)
    for level in range(1, m + 1):
        w = widths[level - 1]
        starts = np.concatenate([[0], parent_bounds[:-1]])
        parent_sizes = parent_bounds - starts
        # Distribute w child slots among parents ∝ parent size (largest
        # remainder), at least one child per parent.
        n_parents = len(parent_bounds)
        raw = parent_sizes / parent_sizes.sum() * (w - n_parents)
        counts = np.floor(raw).astype(np.int64) + 1
        counts = np.minimum(counts, parent_sizes)  # cannot exceed base units
        rem = w - int(counts.sum())
        if rem > 0:
            slack = parent_sizes - counts
            order2 = np.argsort(-(raw - np.floor(raw)), kind="stable")
            for p in order2:
                if rem == 0:
                    break
                add = min(rem, int(slack[p]))
                counts[p] += add
                rem -= add
        bounds: list[int] = []
        uids: list[int] = []
        level_col = np.empty(n_base, dtype=np.int64)
        for p in range(n_parents):
            sizes = _power_law_sizes(int(parent_sizes[p]), int(counts[p]), b)
            off = int(starts[p])
            for s in sizes:
                uid = next_uid
                next_uid += 1
                level_col[off : off + s] = uid
                unit_rows.append((uid, level, int(parent_uids[p]), int(s)))
                off += s
                bounds.append(off)
                uids.append(uid)
        parent_bounds = np.array(bounds, dtype=np.int64)
        parent_uids = np.array(uids, dtype=np.int64)
        map_cols.append(level_col)

    # map_cols[l][p] is the level-(l+1) unit at Z-position p; reindex to
    # base-unit order.
    frames = []
    for level in range(1, m + 1):
        col = np.empty(n_base, dtype=np.int64)
        col[base_in_z] = map_cols[level - 1]
        frames.append(
            pd.DataFrame({"base_unit": ids, "level": level, "unit": col})
        )
    mapping = pd.concat(frames, ignore_index=True)
    units = pd.DataFrame(unit_rows, columns=["unit", "level", "parent", "size"])
    return SpIndex(m=m, n_side=n_side, mapping=mapping, units=units, widths=widths)
