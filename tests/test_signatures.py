"""Tests for entity signatures and routing (Section 3.2.1, Example 3.2)."""
import numpy as np
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.core.cells import entity_level_cells
from repro.core.hashing import HashFamily, build_level_hashes
from repro.core.signatures import entity_paths, entity_signatures
from repro.mobility.im_model import generate_traces_pdf
from repro.spindex.builder import build_sp_index
from tests.paper_example import (
    EA,
    EB,
    EC,
    ED,
    example_hash_family,
    example_sp_index,
    example_traces,
)


@pytest.fixture(scope="module")
def example_sigs(spark):
    sp = example_sp_index()
    fam = example_hash_family()
    tr = spark.createDataFrame(example_traces())
    cells = entity_level_cells(spark, tr, sp)
    lh = build_level_hashes(spark, cells, sp, fam)
    sigs = entity_signatures(cells, lh, fam)
    return sigs.toPandas(), entity_paths(sigs).toPandas()


def test_example_32_signature_table(example_sigs):
    """Example 3.2's signature table (with the paper's sig_d^2 erratum
    corrected to the value its own hash table implies: <3,2> not <3,7>)."""
    sigs, _ = example_sigs
    got = {
        (r.entity, r.level): list(r.sig) for r in sigs.itertuples()
    }
    assert got[(EA, 1)] == [1, 3] and got[(EA, 2)] == [5, 3]
    assert got[(EB, 1)] == [1, 3] and got[(EB, 2)] == [1, 5]
    assert got[(EC, 1)] == [1, 2] and got[(EC, 2)] == [4, 3]
    assert got[(ED, 1)] == [3, 1] and got[(ED, 2)] == [3, 2]


def test_example_32_routing(example_sigs):
    """Routing = argmax of the signature: e_d -> group 1, others -> 2."""
    _, paths = example_sigs
    path_of = {r.entity: list(r.path) for r in paths.itertuples()}
    assert path_of[EA] == [2, 1]
    assert path_of[EB] == [2, 2]
    assert path_of[EC] == [2, 1]
    assert path_of[ED] == [1, 1]  # paper's figure says [1, 2] via the erratum


def test_route_vals_are_array_max(example_sigs):
    sigs, paths = example_sigs
    sig_of = {(r.entity, r.level): np.asarray(r.sig) for r in sigs.itertuples()}
    for r in paths.itertuples():
        for lvl in (1, 2):
            assert r.route_vals[lvl - 1] == sig_of[(r.entity, lvl)].max()
            assert (
                sig_of[(r.entity, lvl)][r.path[lvl - 1] - 1]
                == sig_of[(r.entity, lvl)].max()
            )


@pytest.fixture(scope="module")
def random_sigs(spark):
    sp = build_sp_index(8, 3)
    fam = HashFamily(n_h=6, r=sp.n_base * 48, seed=2)
    tr = spark.createDataFrame(generate_traces_pdf(sp, 40, 48, seed=5))
    cells = entity_level_cells(spark, tr, sp)
    cells.persist()
    lh = build_level_hashes(spark, cells, sp, fam)
    sigs = entity_signatures(cells, lh, fam)
    yield sp, fam, cells, lh, sigs
    cells.unpersist()


def test_signature_is_elementwise_min(spark, random_sigs):
    sp, fam, cells, lh, sigs = random_sigs
    cells_pdf = cells.toPandas()
    h_pdf = lh.toPandas()
    hmap = {(r.level, r.cell): np.asarray(r.h) for r in h_pdf.itertuples()}
    got = {(r.entity, r.level): np.asarray(r.sig) for r in sigs.toPandas().itertuples()}
    for (e, lvl), grp in cells_pdf.groupby(["entity", "level"]):
        expect = np.min(np.stack([hmap[(lvl, c)] for c in grp.cell]), axis=0)
        np.testing.assert_array_equal(got[(e, lvl)], expect)


def test_each_entity_has_m_signatures(random_sigs):
    sp, _, _, _, sigs = random_sigs
    counts = sigs.toPandas().groupby("entity")["level"].nunique()
    assert (counts == sp.m).all()


def test_route_in_range(random_sigs):
    sp, fam, _, _, sigs = random_sigs
    pdf = sigs.toPandas()
    assert pdf.route.between(1, fam.n_h).all()


def test_paths_have_length_m(random_sigs):
    sp, _, _, _, sigs = random_sigs
    paths = entity_paths(sigs).toPandas()
    assert (paths.path.map(len) == sp.m).all()
    assert (paths.route_vals.map(len) == sp.m).all()
