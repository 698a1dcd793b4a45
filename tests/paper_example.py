"""The paper's running example (Examples 3.1, 3.2, 4.1) as fixtures.

Spatial layout: base units L1..L4 (ids 0..3), parents pat(L1)=pat(L2)=L5,
pat(L3)=pat(L4)=L6, m=2. Unit ids: L1..L4 -> 0..3 at level 2, L5 -> 4,
L6 -> 5 at level 1. Times T1=0, T2=1. Cell code = t*6 + unit.

The injected hash table is the paper's Example-3.2 table. NOTE the paper's
signature table lists ``sig_d^2 = <3,7>``, but its own hash table gives
``h2(T1L4)=2, h2(T2L4)=7`` so the element-wise min is ``<3,2>`` — we
follow the definitions (the ``7`` is an erratum; see DESIGN.md).
"""
import pandas as pd

from repro.core.hashing import HashFamily
from repro.spindex.builder import SpIndex

# entity ids
EA, EB, EC, ED = 0, 1, 2, 3


def example_sp_index() -> SpIndex:
    mapping = pd.DataFrame(
        [
            # (base_unit, level, unit)
            (0, 1, 4), (1, 1, 4), (2, 1, 5), (3, 1, 5),
            (0, 2, 0), (1, 2, 1), (2, 2, 2), (3, 2, 3),
        ],
        columns=["base_unit", "level", "unit"],
    )
    units = pd.DataFrame(
        [
            (4, 1, -1, 2), (5, 1, -1, 2),
            (0, 2, 4, 1), (1, 2, 4, 1), (2, 2, 5, 1), (3, 2, 5, 1),
        ],
        columns=["unit", "level", "parent", "size"],
    )
    return SpIndex(m=2, n_side=2, mapping=mapping, units=units, widths=[2, 4])


def example_hash_family() -> HashFamily:
    # base cell code = t*6 + base unit id (units L1..L4 are ids 0..3)
    def code(t, li):
        return t * 6 + (li - 1)

    table = {
        code(0, 1): [2, 8],  # T1L1
        code(1, 1): [8, 3],  # T2L1
        code(0, 2): [5, 6],  # T1L2
        code(1, 2): [1, 5],  # T2L2
        code(0, 3): [4, 4],  # T1L3
        code(1, 3): [6, 1],  # T2L3
        code(0, 4): [7, 2],  # T1L4
        code(1, 4): [3, 7],  # T2L4
    }
    return HashFamily(n_h=2, r=12, seed=0, table=table)


def example_traces() -> pd.DataFrame:
    rows = [
        (EA, 0, 1), (EA, 1, 0),  # e_a: T1@L2, T2@L1
        (EB, 0, 0), (EB, 1, 1),  # e_b: T1@L1, T2@L2
        (EC, 0, 2), (EC, 1, 0),  # e_c: T1@L3, T2@L1
        (ED, 0, 3), (ED, 1, 3),  # e_d: T1@L4, T2@L4
    ]
    return pd.DataFrame(rows, columns=["entity", "t", "base_unit"])
