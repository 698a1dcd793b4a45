"""Figure 4: pruning effectiveness vs. the ADM parameters u and v.

One index per dataset (the index is ADM-independent); the search is run
under every (u, v) combination. The paper reports better PE for smaller
u (level weight) and larger v (duration weight).
"""
from __future__ import annotations

import pandas as pd

from repro.core.adm import ADMParams
from repro.core.query import TopKEngine
from repro.eval.harness import (
    build_index,
    measure_pe,
    pick_queries,
    realsim_spec,
    syn_spec,
)

US = (0.5, 1.0, 2.0)
VS = (0.5, 1.0, 2.0)


def run(spark, quick: bool = False) -> pd.DataFrame:
    n_entities = 300 if quick else 1500
    n_queries = 2 if quick else 6
    rows = []
    specs = [syn_spec(n_entities=n_entities, n_side=24, t_max=96)]
    if not quick:
        specs.append(realsim_spec(n_entities=n_entities, n_side=24, t_max=96))
    for spec in specs:
        tree, _ = build_index(spark, spec, n_h=32 if quick else 128)
        queries = pick_queries(tree, n_queries)
        for u in US:
            for v in VS:
                eng = TopKEngine(spark, tree, ADMParams(m=spec.m, u=u, v=v))
                pes, kths, rich = [], [], []
                for q in queries:
                    r = eng.topk(int(q), 10)
                    kth = r.results[-1][1] if r.results else 0.0
                    pes.append(r.pruning_effectiveness)
                    kths.append(kth)
                    # "association-rich" queries: the regime the paper's
                    # population provides for every query (kth degree
                    # comparable to the top degree, Fig. 10)
                    if kth >= 0.15:
                        rich.append(r.pruning_effectiveness)
                import numpy as np

                rows.append(
                    {
                        "dataset": spec.name,
                        "u": u,
                        "v": v,
                        "k": 10,
                        "pe": float(np.mean(pes)),
                        "pe_assoc_rich": float(np.mean(rich)) if rich else float("nan"),
                        "n_rich": len(rich),
                        "kth_degree": float(np.mean(kths)),
                    }
                )
        tree.unpersist()
    return pd.DataFrame(rows)


if __name__ == "__main__":
    from jobs._common import run_main

    run_main(run, "fig4_pe_vs_adm")
