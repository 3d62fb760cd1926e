"""SNB Interactive: indexed (HiActor) vs scan (baseline) must agree."""
import numpy as np
import pytest

from repro.datasets import snb
from repro.query import snb_interactive as si


@pytest.fixture(scope="module")
def accesses():
    pg = snb.snb_graph(n_persons=120, seed=23)
    return pg, si.IndexedAccess(pg), si.ScanAccess(pg)


def _persons(pg, k=15):
    return pg.vertices["Person"].id.to_numpy()[:k]


@pytest.mark.parametrize("qname", list(si.COMPLEX))
def test_complex_queries_agree(accesses, qname):
    pg, idx, scan = accesses
    fn = si.COMPLEX[qname]
    for p in _persons(pg):
        if qname == "C1":
            a, b = fn(idx, int(p), "beijing"), fn(scan, int(p), "beijing")
        elif qname == "C2":
            a, b = fn(idx, int(p), 2500), fn(scan, int(p), 2500)
        else:
            a, b = fn(idx, int(p)), fn(scan, int(p))
        assert a == b, f"{qname} mismatch for person {p}"


@pytest.mark.parametrize("qname", list(si.SHORT))
def test_short_queries_agree(accesses, qname):
    pg, idx, scan = accesses
    fn = si.SHORT[qname]
    targets = (
        pg.vertices["Post"].id.to_numpy()[:15] if qname == "S4" else _persons(pg)
    )
    for t in targets:
        assert fn(idx, int(t)) == fn(scan, int(t)), f"{qname} mismatch for {t}"


def test_updates_visible_in_both(accesses):
    pg, idx, scan = accesses
    evs = snb.update_stream(pg, n_updates=30, seed=4)
    for ev in evs:
        si.apply_update(idx, ev)
        si.apply_update(scan, ev)
    for ev in evs:
        if ev["kind"] == "add_person":
            assert idx.vertex("Person", ev["id"]) is not None
            assert scan.vertex("Person", ev["id"]) is not None
        elif ev["kind"] == "add_knows":
            assert ev["dst"] in idx.neighbors(ev["src"], "KNOWS", "out")
            assert ev["dst"] in scan.neighbors(ev["src"], "KNOWS", "out")
    # post-update query agreement still holds
    for p in _persons(pg, 10):
        assert si.s3_friends(idx, int(p)) == si.s3_friends(scan, int(p))
        assert si.c3_city_counts(idx, int(p)) == si.c3_city_counts(scan, int(p))


def test_workload_runs_on_both(accesses):
    pg, idx, scan = accesses
    ops = si.make_workload(pg, n_ops=60, seed=3)
    for name, fn in ops:
        ra = fn(si.IndexedAccess(pg) if False else idx)
        rb = fn(scan)
        if not name.startswith("U_"):
            assert type(ra) is type(rb)


def test_c1_oracle_duckdb(accesses):
    import duckdb

    pg, idx, _ = accesses
    con = duckdb.connect()
    con.register("person", pg.vertices["Person"])
    con.register("knows", pg.edges["KNOWS"])
    p = int(pg.vertices["Person"].id.iloc[0])
    got = si.c1_friends_in_city(idx, p, "paris", k=1000)
    want = con.execute(
        """
        WITH f1 AS (SELECT dst AS id FROM knows WHERE src = ?),
             f2 AS (SELECT k.dst AS id FROM f1 JOIN knows k ON k.src = f1.id),
             cand AS (SELECT DISTINCT id FROM (SELECT id FROM f1 UNION ALL SELECT id FROM f2))
        SELECT cand.id, p.name FROM cand JOIN person p ON p.id = cand.id
        WHERE p.city = 'paris' AND cand.id != ? ORDER BY p.name
        """,
        [p, p],
    ).fetchall()
    assert [(a, b) for a, b in got] == [(a, b) for a, b in want]
    con.close()
