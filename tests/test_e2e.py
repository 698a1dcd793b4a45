"""End-to-end integration: generate -> index -> query -> verify, both regimes."""
import numpy as np
import pytest

from repro.core.adm import ADMParams
from repro.core.query import TopKEngine
from repro.eval.harness import (
    build_index,
    measure_pe,
    pick_queries,
    realsim_spec,
    syn_spec,
)


@pytest.mark.parametrize("make_spec", [syn_spec, realsim_spec], ids=["SYN", "REALSIM"])
def test_pipeline_end_to_end(spark, make_spec):
    spec = make_spec(n_entities=150, n_side=12, t_max=48, m=3)
    tree, build_secs = build_index(spark, spec, n_h=16)
    assert build_secs > 0
    assert tree.n_entities == 150
    eng = TopKEngine(spark, tree, ADMParams(m=3))
    queries = pick_queries(tree, 3)
    res = measure_pe(eng, queries, 5)
    assert 0.0 <= res.mean_pe <= 1.0
    assert res.mean_checked >= 5
    # exactness spot-check against brute force
    q = int(queries[0])
    np.testing.assert_allclose(
        sorted(s for _, s in eng.topk(q, 5).results),
        sorted(s for _, s in eng.brute_force(q, 5).results),
        atol=1e-9,
    )
    tree.unpersist()


def test_jobs_quick_smoke(spark):
    """Every jobs/ entrypoint produces a non-empty table in quick mode."""
    from jobs.fig7_indexing_cost import run as fig7

    table = fig7(spark, quick=True)
    assert len(table) == 2
    assert (table.build_seconds > 0).all()
    # index stays small relative to the raw data (§6.8); the build-time
    # growth with n_h is asserted on the full-scale run (results/fig7),
    # not here where JVM warm-up noise dominates second-scale builds.
    assert (table.index_to_raw < 0.5).all()
