"""Quick end-to-end smoke of the pipeline (not a test)."""
import os, sys, time

sys.path.insert(0, "/root/repo")
import conftest  # noqa: F401  (sets PYSPARK_SUBMIT_ARGS)
from pyspark.sql import SparkSession

spark = (
    SparkSession.builder.appName("smoke")
    .config("spark.sql.shuffle.partitions", "8")
    .config("spark.sql.execution.arrow.pyspark.enabled", "true")
    .getOrCreate()
)
spark.sparkContext.setLogLevel("ERROR")

import numpy as np
from repro.eval.harness import syn_spec, build_index, pick_queries, measure_pe
from repro.core.adm import ADMParams
from repro.core.query import TopKEngine

t0 = time.time()
spec = syn_spec(n_entities=200, n_side=16, t_max=48, m=3)
tree, build_s = build_index(spark, spec, n_h=16)
print(f"build: {build_s:.1f}s nodes={len(tree.nodes)} leaves={tree.leaves.key.nunique()} entities={tree.n_entities}")
adm = ADMParams(m=spec.m, u=1.0, v=1.0)
eng = TopKEngine(spark, tree, adm)
qs = pick_queries(tree, 3)
for q in qs:
    r = eng.topk(int(q), 5)
    bf = eng.brute_force(int(q), 5)
    s1 = sorted(s for _, s in r.results)
    s2 = sorted(s for _, s in bf.results)
    ok = np.allclose(s1, s2, atol=1e-9)
    print(f"q={q} topk={r.results[:3]} checked={r.checked} pe={r.pruning_effectiveness:.3f} exact={ok}")
    assert ok, (s1, s2)
print(f"total {time.time()-t0:.1f}s")
spark.stop()
