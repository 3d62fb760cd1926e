"""Early smoke test: datasets + every storage backend round-trips."""
import numpy as np
import pandas as pd
import pytest

from repro.datasets import graphalytics, graphs, snb
from repro.storage.gart import GartStore
from repro.storage.graphar import GraphArStore, fetch_neighbors, write_graphar
from repro.storage.grin import Trait
from repro.storage.livegraph import LiveGraphStore
from repro.storage.csr import NumpyCSR, StaticCSRStore
from repro.storage.vineyard import VineyardStore


@pytest.fixture(scope="module")
def pg():
    g = snb.snb_graph(n_persons=120, seed=7)
    g.validate()
    return g


def test_rmat_deterministic():
    a = graphs.rmat_edges(scale=8, n_edges=500, seed=3)
    b = graphs.rmat_edges(scale=8, n_edges=500, seed=3)
    pd.testing.assert_frame_equal(a, b)
    assert (a.src != a.dst).all()


def test_table1_generate():
    e = graphalytics.generate("CF", max_edges=2000)
    assert len(e) <= 2000
    assert e.src.min() >= 0


def test_vineyard_roundtrip(spark, pg):
    store = VineyardStore(spark, pg)
    assert store.supports(Trait.TOPOLOGY)
    assert store.vertices("Person").count() == len(pg.vertices["Person"])
    assert store.adjacency().count() == pg.num_edges
    got = store.edges("KNOWS").count()
    assert got == len(pg.edges["KNOWS"])


def test_gart_mvcc(spark, pg):
    store = GartStore(spark, pg)
    n0 = store.edges("KNOWS").count()
    v0 = store.write_version
    # key guaranteed absent from the generated KNOWS edges
    existing = set(map(tuple, pg.edges["KNOWS"][["src", "dst"]].itertuples(index=False)))
    s, d = snb.PERSON_BASE, snb.PERSON_BASE + 1
    while (s, d) in existing:
        d += 1
    new = pd.DataFrame({"src": [s], "dst": [d], "creationDate": [9999]})
    v1 = store.insert_edges("KNOWS", new)
    assert store.snapshot(v0).edges("KNOWS").count() == n0
    assert store.snapshot(v1).edges("KNOWS").count() == n0 + 1
    v2 = store.delete_edges("KNOWS", new)
    assert store.snapshot(v2).edges("KNOWS").count() == n0
    assert store.snapshot(v1).edges("KNOWS").count() == n0 + 1
    store.compact()
    assert store.edges("KNOWS").count() == n0


def test_livegraph_matches_gart(spark, pg):
    gart = GartStore(spark, pg)
    lg = LiveGraphStore(spark, pg)
    new = pd.DataFrame({"src": [snb.PERSON_BASE + 2], "dst": [snb.PERSON_BASE + 3],
                        "creationDate": [9999]})
    gart.insert_edges("KNOWS", new)
    lg.insert_edges("KNOWS", new)
    a = set(map(tuple, gart.adjacency().select("src", "dst").collect()))
    b = set(map(tuple, lg.adjacency().select("src", "dst").collect()))
    assert a == b


def test_graphar_roundtrip(spark, pg, tmp_path):
    write_graphar(pg, tmp_path, edge_chunk_size=200)
    store = GraphArStore(spark, tmp_path, use_datasource=False)
    assert store.edges("KNOWS").count() == len(pg.edges["KNOWS"])
    vid = int(pg.edges["KNOWS"].src.iloc[0])
    nb = fetch_neighbors(tmp_path, "KNOWS", vid)
    expect = set(pg.edges["KNOWS"].query("src == @vid").dst)
    assert set(nb.dst) == expect


def test_graphar_datasource(spark, pg, tmp_path):
    write_graphar(pg, tmp_path, edge_chunk_size=200)
    store = GraphArStore(spark, tmp_path, use_datasource=True)
    df = store.edges("KNOWS")
    assert df.count() == len(pg.edges["KNOWS"])


def test_static_csr_and_numpy(spark):
    e = graphs.uniform_edges(n_vertices=50, n_edges=300, seed=1)
    dense, n = graphs.compact_ids(e)
    store = StaticCSRStore(spark, dense)
    assert store.adjacency().count() == len(dense)
    csr = NumpyCSR.from_edges(dense, n)
    assert csr.num_edges == len(dense)
    v = int(dense.src.iloc[0])
    assert set(csr.neighbors(v)) == set(dense.query("src == @v").dst)
    f = np.array([0, 1], dtype=np.int64)
    assert len(csr.neighbors_batch(f)) == csr.degree(0) + csr.degree(1)
