"""Figure 5: query time vs. allocated memory size.

Entity records are laid out in MinSigTree-leaf order as parquet blocks;
an in-memory cache pins the first ``f`` fraction of blocks. Exact-scoring
fetches go through the store (disk on miss), so query latency falls as
the memory budget grows — super-linearly at first, flattening once the
cache covers ~40-50% of the data (§6.6).
"""
from __future__ import annotations

import tempfile
import time

import pandas as pd

from repro.core.adm import ADMParams
from repro.core.query import TopKEngine
from repro.eval.harness import build_index, pick_queries, syn_spec
from repro.eval.memstore import LeafBlockStore, LocalScoringEngine

FRACTIONS = (0.1, 0.2, 0.4, 0.6, 0.8, 1.0)
KS = (1, 10, 50)


def run(spark, quick: bool = False) -> pd.DataFrame:
    spec = syn_spec(n_entities=300 if quick else 2000, n_side=24, t_max=96)
    tree, _ = build_index(spark, spec, n_h=32 if quick else 128)
    queries = pick_queries(tree, 3 if quick else 6)
    rows = []
    with tempfile.TemporaryDirectory() as tmp:
        store = LeafBlockStore(spark, tree, tmp, entities_per_block=32)
        eng = LocalScoringEngine(spark, tree, ADMParams(m=spec.m), store)
        for q in queries:  # warm the query-cell cache (Spark side, f-free)
            eng.query_cells(int(q))
        fractions = FRACTIONS[:3] if quick else FRACTIONS
        for f in fractions:
            store.set_cache_fraction(f)
            for k in KS:
                t0 = time.perf_counter()
                for q in queries:
                    eng.topk(int(q), k)
                per_query = (time.perf_counter() - t0) / len(queries)
                rows.append(
                    {"memory_fraction": f, "k": k, "seconds_per_query": per_query}
                )
    tree.unpersist()
    return pd.DataFrame(rows)


if __name__ == "__main__":
    from jobs._common import run_main

    run_main(run, "fig5_time_vs_memory")
