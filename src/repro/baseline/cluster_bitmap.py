"""Locality-cluster bitmap baseline — Section 6.2.

The paper's baseline partitions ST-cells into clusters of frequently
co-occurring cells, gives each entity an n-bit membership vector, and
searches groups of identical bit vectors in upper-bound order. We realize
the clustering as (coarse spatial ancestor x time window) — cells in the
same region during the same window are exactly the ones that co-occur in
entity "transactions", so this is the *strongest* instance of the
transaction-clustering family the paper describes (see DESIGN.md); the
paper's argument for why such baselines lose (ST-cells have low locality,
so bit vectors give loose bounds, §6.7) applies unchanged.

Exactness is preserved: bit ``j = 0`` certifies the entity visited no
observed base cell of cluster ``j``, and a level-l query cell can only be
shared through an observed base cell below it, so a query cell none of
whose covering clusters are set cannot contribute to the intersection.
The search loop and termination rule are inherited from `TopKEngine`.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession
from pyspark.sql import functions as F

from repro.core.adm import ADMParams
from repro.core.minsigtree import MinSigTree
from repro.core.query import TopKEngine, _QueryCells


class BitmapEngine(TopKEngine):
    """Top-k search over cluster-membership bitmap groups (§6.2)."""

    def __init__(
        self,
        spark: SparkSession,
        tree: MinSigTree,
        adm: ADMParams,
        cluster_level: int = 1,
        time_window: int = 24,
        size_aware: bool = True,
        cluster_mode: str = "locality",
        n_random_clusters: int = 32,
    ):
        """``cluster_mode``:

        * ``"locality"`` — (coarse region x time window) clusters: the
          *strongest* member of the transaction-clustering family, an
          upper bound on what FP mining could extract;
        * ``"coupled"`` — cells hashed uniformly into
          ``n_random_clusters`` buckets: the regime the paper describes
          for FP-mined clusters at scale ("strong coupling", no locality,
          §6.2/§6.7), where bit vectors saturate and bounds go slack.
        """
        super().__init__(spark, tree, adm, size_aware=size_aware)
        self.cluster_level = cluster_level
        self.time_window = time_window
        self.cluster_mode = cluster_mode
        sp = tree.sp
        from repro.core.cells import mapping_df

        mp = mapping_df(spark, sp)
        bridge = mp.filter(F.col("level") == sp.m).select(
            "base_unit", F.col("unit").alias("b_uid")
        )
        clus = mp.filter(F.col("level") == cluster_level).select(
            "base_unit", F.col("unit").alias("c_unit")
        )
        base = tree.cells.filter(F.col("level") == sp.m).select(
            "entity", "t", F.col("unit").alias("b_uid"), F.col("cell").alias("b_cell")
        )
        if cluster_mode == "coupled":
            cluster_col = F.pmod(
                F.col("b_cell") * 2654435761 + 97, F.lit(n_random_clusters)
            )
        elif cluster_mode == "locality":
            cluster_col = F.col("c_unit") * 1_000_000 + (
                F.col("t") / time_window
            ).cast("long")
        else:
            raise ValueError(f"unknown cluster_mode {cluster_mode!r}")
        with_cluster = (
            base.join(F.broadcast(bridge), "b_uid")
            .join(F.broadcast(clus), "base_unit")
            .withColumn("cluster", cluster_col)
        ).persist()
        # Entity bit vectors.
        vec_pdf = (
            with_cluster.groupBy("entity")
            .agg(F.sort_array(F.collect_set("cluster")).alias("clusters"))
            .toPandas()
        )
        # Cover table: level-l cell -> clusters of observed base cells below.
        n_units = sp.n_units_total
        anc = mp.select("base_unit", "level", F.col("unit").alias("anc_unit"))
        cover_pdf = (
            with_cluster.select("base_unit", "t", "cluster")
            .distinct()
            .join(F.broadcast(anc), "base_unit")
            .select(
                "level",
                (F.col("t").cast("long") * n_units + F.col("anc_unit")).alias("cell"),
                "cluster",
            )
            .distinct()
            .toPandas()
        )
        with_cluster.unpersist()

        cluster_ids = np.sort(cover_pdf.cluster.unique())
        self._cluster_pos = {int(c): i for i, c in enumerate(cluster_ids)}
        self.n_clusters = len(cluster_ids)
        # Group entities by identical vectors (the paper's bitmap rows).
        vec_pdf["key"] = vec_pdf.clusters.map(lambda cs: ",".join(map(str, cs)))
        groups = vec_pdf.groupby("key")
        self._leaf_keys = []
        self._leaf_entities = []
        vecs = []
        for key, grp in groups:
            self._leaf_keys.append(key)
            self._leaf_entities.append(grp.entity.tolist())
            v = np.zeros(self.n_clusters, dtype=bool)
            for c in grp.clusters.iloc[0]:
                v[self._cluster_pos[int(c)]] = True
            vecs.append(v)
        self._vectors = (
            np.stack(vecs) if vecs else np.zeros((0, self.n_clusters), bool)
        )
        # Per-level cell -> cluster membership (bool rows), for query UBs.
        self._cover: dict[int, dict[int, np.ndarray]] = {}
        for l, grp in cover_pdf.groupby("level"):
            d: dict[int, np.ndarray] = {}
            for cell, cgrp in grp.groupby("cell"):
                row = np.zeros(self.n_clusters, dtype=bool)
                row[[self._cluster_pos[int(c)] for c in cgrp.cluster]] = True
                d[int(cell)] = row
            self._cover[int(l)] = d
        self._finalize_groups()  # re-index entities by bitmap group

    def leaf_upper_bounds(self, qc: _QueryCells) -> np.ndarray:
        """UB per bitmap group: query cells reachable through set bits."""
        g = len(self._leaf_keys)
        surv = np.zeros((g, self.m), dtype=np.float64)
        for l in range(1, self.m + 1):
            cells = qc.levels.get(l)
            if cells is None or not len(cells):
                continue
            cov = self._cover.get(l, {})
            q_mat = np.stack(
                [cov.get(int(c), np.zeros(self.n_clusters, bool)) for c in cells]
            )
            surv[:, l - 1] = (q_mat @ self._vectors.T.astype(np.int64) > 0).sum(
                axis=0
            )
        return self._bounds_from_surv(surv, qc)
