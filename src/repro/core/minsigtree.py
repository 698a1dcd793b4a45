"""MinSigTree construction and updates — Sections 3.2.2-3.2.3.

The tree is materialized as two small relations (the paper stores two
integers per node — routing index and the hash value at it):

* ``nodes``: one row per tree node — ``(level, key, route, sig_val,
  n_entities)`` where ``key`` is the "/"-joined routing path from the root
  and ``sig_val = min over subtree entities of sig_e^level[route]`` (the
  materialized ``SIG_N[u]`` of §3.2.2);
* ``leaves``: ``(entity, key)`` leaf membership (full ``m``-length path).

Both are built with Catalyst aggregations from the entity signature
relation, then collected to the driver (≤ ``m·|E|`` tiny rows) where the
best-first search runs; the per-cell relations (``cells``,
``level_hashes``) stay distributed and persisted for scoring joins.

Bulk update (§3.2.3) appends new trace records: affected entities get
fresh signatures, move leaves, and node values merge via
``SIG_N := min(SIG_N, SIG_new)``. Removal does not raise stale node
minima — a too-small ``SIG_N`` only loosens upper bounds, never breaks
exactness (tested).
"""
from __future__ import annotations

import time
from dataclasses import dataclass

import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.core.cells import entity_level_cells, level_sizes
from repro.core.hashing import HashFamily, build_level_hashes
from repro.core.signatures import entity_paths, entity_signatures
from repro.spindex.builder import SpIndex


@dataclass
class MinSigTree:
    """A built index plus the distributed relations needed to query it."""

    sp: SpIndex
    fam: HashFamily
    nodes: pd.DataFrame  # (level, key, route, sig_val, n_entities)
    leaves: pd.DataFrame  # (entity, key)
    sizes: pd.DataFrame  # (entity, level, sz)  — |seq_e^l|
    cells: DataFrame  # (entity, level, t, unit, cell)   [persisted]
    level_hashes: DataFrame  # (level, t, unit, cell, h) [persisted]
    traces: DataFrame  # raw (entity, t, base_unit)      [persisted]

    @property
    def m(self) -> int:
        return self.sp.m

    @property
    def n_entities(self) -> int:
        return len(self.leaves)

    def index_size_bytes(self) -> int:
        """Paper's accounting: 2 ints per node + 1 pointer per leaf entity."""
        n_nodes = len(self.nodes)
        return 2 * 4 * n_nodes + 8 * len(self.leaves)

    def unpersist(self) -> None:
        for df in (self.cells, self.level_hashes, self.traces):
            try:
                df.unpersist()
            except Exception:
                pass


def _prefix_counts(nodes: pd.DataFrame, leaves: pd.DataFrame) -> pd.Series:
    """Recompute each node's entity count from current leaf membership."""
    counts: dict[str, int] = {}
    for key in leaves.key:
        parts = key.split("/")
        for i in range(1, len(parts) + 1):
            pk = "/".join(parts[:i])
            counts[pk] = counts.get(pk, 0) + 1
    return nodes.key.map(counts).fillna(0).astype("int64")


def _nodes_and_leaves(
    spark: SparkSession, paths: DataFrame, m: int
) -> tuple[pd.DataFrame, pd.DataFrame]:
    """Aggregate per-entity routing paths into node and leaf tables."""
    lvl = spark.range(1, m + 1).select(F.col("id").cast("int").alias("level"))
    pref = paths.crossJoin(F.broadcast(lvl)).select(
        "entity",
        "level",
        F.concat_ws("/", F.slice("path", 1, F.col("level"))).alias("key"),
        F.element_at("path", F.col("level")).alias("route"),
        F.element_at("route_vals", F.col("level")).alias("sig_val"),
    )
    nodes = (
        pref.groupBy("level", "key", "route")
        .agg(
            F.min("sig_val").alias("sig_val"),
            F.count("*").alias("n_entities"),
        )
        .toPandas()
        .sort_values(["level", "key"], ignore_index=True)
    )
    leaves = (
        pref.filter(F.col("level") == m)
        .select("entity", "key")
        .toPandas()
        .sort_values("entity", ignore_index=True)
    )
    return nodes, leaves


def build_minsigtree(
    spark: SparkSession,
    traces: DataFrame,
    sp: SpIndex,
    fam: HashFamily,
    persist: bool = True,
) -> MinSigTree:
    """Build the MinSigTree (Algorithm 1) over a trace DataFrame."""
    if persist:
        traces = traces.persist()
    cells = entity_level_cells(spark, traces, sp)
    if persist:
        cells = cells.persist()
    lh = build_level_hashes(spark, cells, sp, fam)
    if persist:
        lh = lh.persist()
    sigs = entity_signatures(cells, lh, fam)
    paths = entity_paths(sigs)
    nodes, leaves = _nodes_and_leaves(spark, paths, sp.m)
    sizes = level_sizes(cells).toPandas()
    return MinSigTree(
        sp=sp,
        fam=fam,
        nodes=nodes,
        leaves=leaves,
        sizes=sizes,
        cells=cells,
        level_hashes=lh,
        traces=traces,
    )


def bulk_update(
    spark: SparkSession, tree: MinSigTree, new_traces: DataFrame
) -> tuple[MinSigTree, float]:
    """Apply a batch of new trace records (§3.2.3); returns (tree, seconds).

    Entities appearing in ``new_traces`` may be existing (their records are
    appended and signatures recomputed — steps 1-4 of §3.2.3) or brand new
    (steps 3-4 only). Node signature values merge by min; leaf membership
    moves. The timing covers signature recomputation and index surgery,
    which is what Fig. 8 measures.
    """
    t0 = time.perf_counter()
    new_traces = new_traces.persist()
    updated = new_traces.select("entity").distinct()

    merged_traces = tree.traces.unionByName(new_traces).persist()
    # Recompute the full per-entity relations for affected entities only.
    affected_traces = merged_traces.join(F.broadcast(updated), "entity")
    new_cells = entity_level_cells(spark, affected_traces, tree.sp).persist()
    merged_cells = (
        tree.cells.join(F.broadcast(updated), "entity", "left_anti")
        .unionByName(new_cells)
        .persist()
    )
    # Cell hashes are a pure function of the cell (min over *all* grid
    # children — see hashing.build_level_hashes), so existing rows stay
    # valid; only hash cells never observed before and union-dedup.
    lh_new = build_level_hashes(spark, new_cells, tree.sp, tree.fam)
    lh = (
        tree.level_hashes.unionByName(lh_new)
        .dropDuplicates(["level", "cell"])
        .persist()
    )
    sigs = entity_signatures(new_cells, lh, tree.fam)
    paths = entity_paths(sigs)
    new_nodes, new_leaves = _nodes_and_leaves(spark, paths, tree.m)

    upd_ids = set(new_leaves.entity)
    leaves = pd.concat(
        [tree.leaves[~tree.leaves.entity.isin(upd_ids)], new_leaves],
        ignore_index=True,
    ).sort_values("entity", ignore_index=True)
    nodes = (
        pd.concat([tree.nodes, new_nodes], ignore_index=True)
        .groupby(["level", "key", "route"], as_index=False)
        .agg(sig_val=("sig_val", "min"))
        .sort_values(["level", "key"], ignore_index=True)
    )
    nodes["n_entities"] = _prefix_counts(nodes, leaves)
    # An emptied leaf (every entity moved away) is removed, as in §3.2.3.
    nodes = nodes[nodes.n_entities > 0].reset_index(drop=True)
    new_sizes = level_sizes(new_cells).toPandas()
    sizes = pd.concat(
        [
            tree.sizes[~tree.sizes.entity.isin(upd_ids)],
            new_sizes,
        ],
        ignore_index=True,
    )
    elapsed = time.perf_counter() - t0
    out = MinSigTree(
        sp=tree.sp,
        fam=tree.fam,
        nodes=nodes,
        leaves=leaves,
        sizes=sizes,
        cells=merged_cells,
        level_hashes=lh,
        traces=merged_traces,
    )
    return out, elapsed
