"""Figure 8: bulk-update cost vs. the number of hash functions.

A batch of new trace records for a fixed number of entities is applied to
an already-built MinSigTree; the mix of existing vs. brand-new entities is
varied (100% / 70% / 40% existing, as in the paper). Updating existing
entities costs more than inserting new ones (locate + remove steps), and
time grows with n_h like the build does.
"""
from __future__ import annotations

import pandas as pd

from repro.core.minsigtree import bulk_update
from repro.eval.harness import build_index, syn_spec
from repro.mobility.im_model import generate_traces


def run(spark, quick: bool = False) -> pd.DataFrame:
    n_hashes = (8, 32) if quick else (8, 32, 128, 512)
    n_entities = 300 if quick else 1500
    n_update = 50 if quick else 300
    spec = syn_spec(n_entities=n_entities, n_side=24, t_max=96)
    sp = spec.sp_index()
    rows = []
    from pyspark.sql import functions as F

    for n_h in n_hashes:
        tree, _ = build_index(spark, spec, n_h=n_h)
        for frac_existing in (1.0, 0.7, 0.4):
            n_exist = int(n_update * frac_existing)
            # Existing entities 0..n_exist-1 get later records (time shift);
            # the rest are brand-new entity ids above the population.
            # bulk_update leaves the source tree untouched, so one build
            # serves all three mixes.
            upd = generate_traces(
                spark, sp, n_update, spec.t_max, spec.params, seed=spec.seed + 99
            )
            upd = upd.withColumn(
                "entity",
                F.when(F.col("entity") < n_exist, F.col("entity")).otherwise(
                    F.col("entity") + n_entities
                ),
            ).withColumn("t", (F.col("t") + spec.t_max).cast("int"))
            updated, secs = bulk_update(spark, tree, upd)
            rows.append(
                {
                    "n_h": n_h,
                    "pct_existing": int(frac_existing * 100),
                    "n_updated": n_update,
                    "update_seconds": secs,
                }
            )
            updated.unpersist()
        tree.unpersist()
    return pd.DataFrame(rows)


if __name__ == "__main__":
    from jobs._common import run_main

    run_main(run, "fig8_update_cost")
