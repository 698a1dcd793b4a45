"""Figure 7: index construction cost vs. the number of hash functions.

(a) wall-clock build time of the MinSigTree (signature computation is the
dominant term, linear in n_h); (b) index size — two integers per node
plus one pointer per indexed entity — relative to the raw data size.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import functions as F

from repro.eval.harness import build_index, syn_spec


def run(spark, quick: bool = False) -> pd.DataFrame:
    n_hashes = (8, 32) if quick else (8, 32, 128, 512)
    spec = syn_spec(n_entities=300 if quick else 1500, n_side=24, t_max=96)
    rows = []
    for n_h in n_hashes:
        tree, secs = build_index(spark, spec, n_h=n_h)
        raw_rows = tree.traces.count()
        raw_bytes = raw_rows * (8 + 4 + 4)  # entity, t, base_unit
        rows.append(
            {
                "n_h": n_h,
                "build_seconds": secs,
                "n_nodes": len(tree.nodes),
                "n_leaves": tree.leaves.key.nunique(),
                "index_bytes": tree.index_size_bytes(),
                "raw_bytes": raw_bytes,
                "index_to_raw": tree.index_size_bytes() / raw_bytes,
            }
        )
        tree.unpersist()
    return pd.DataFrame(rows)


if __name__ == "__main__":
    from jobs._common import run_main

    run_main(run, "fig7_indexing_cost")
