"""Figure 3: pruning effectiveness vs. data characteristics.

One-at-a-time sweep of the hierarchical IM-model parameters
(α, β, γ, ρ, ζ) and the sp-index parameters (a, b, m), all others fixed
at the paper's 'normal' values; Top-1/10/50 PE on SYN.
"""
from __future__ import annotations

from dataclasses import replace

import pandas as pd

from repro.core.adm import ADMParams
from repro.core.query import TopKEngine
from repro.eval.harness import build_index, measure_pe, pick_queries, syn_spec
from repro.mobility.im_model import IMParams

SWEEPS = {
    "alpha": (0.2, 0.6, 1.0),
    "beta": (0.4, 0.8, 1.2),
    "gamma": (0.0, 0.2, 0.6),
    "rho": (0.3, 0.6, 0.9),
    "zeta": (0.6, 1.2, 1.8),
    "a": (1.0, 2.0),
    "b": (1.0, 2.0),
    "m": (2, 3, 4),
}
KS = (1, 10, 50)


def _spec_for(param: str, value, n_entities: int):
    base = syn_spec(n_entities=n_entities, n_side=24, t_max=96)
    if param in ("a", "b"):
        return replace(base, **{param: float(value)})
    if param == "m":
        return replace(base, m=int(value))
    return replace(base, params=replace(IMParams(), **{param: float(value)}))


def run(spark, quick: bool = False) -> pd.DataFrame:
    n_entities = 300 if quick else 1000
    n_queries = 2 if quick else 5
    n_h = 32 if quick else 128
    sweeps = {"alpha": SWEEPS["alpha"], "m": SWEEPS["m"]} if quick else SWEEPS
    rows = []
    for param, values in sweeps.items():
        for value in values:
            spec = _spec_for(param, value, n_entities)
            tree, _ = build_index(spark, spec, n_h=n_h)
            eng = TopKEngine(spark, tree, ADMParams(m=spec.m))
            queries = pick_queries(tree, n_queries)
            for k in KS:
                res = measure_pe(eng, queries, k)
                rows.append(
                    {
                        "param": param,
                        "value": value,
                        "k": k,
                        "pe": res.mean_pe,
                        "mean_checked": res.mean_checked,
                    }
                )
            tree.unpersist()
    return pd.DataFrame(rows)


if __name__ == "__main__":
    from jobs._common import run_main

    run_main(run, "fig3_pe_vs_datachar")
