"""LDBC SNB Interactive workload, scaled (Exp-2b).

The paper reports official audit results: HiActor-based GraphScope Flex
vs TuGraph on SNB-300 — 14 complex reads, 7 short reads, 8 updates,
8.92× average latency advantage and 2.45× throughput.

Scaled reproduction: a representative subset of each class (C1–C5,
S1–S4, U1–U3) on the SNB-lite schema.  Every query is written ONCE
against the :class:`DataAccess` interface; two implementations supply
the access path:

* :class:`IndexedAccess` — HiActor-style sorted-adjacency + id-indexed
  property tables (actor-shard state);
* :class:`ScanAccess` — the baseline stand-in: identical data held as
  raw arrays, every lookup a full scan (a graph store without
  adjacency indexes — the architectural gap our TuGraph stand-in
  models; see DESIGN.md §5).

Both accept the same update events, so correctness tests can diff the
two implementations query-by-query after an update stream.
"""
from __future__ import annotations

from abc import ABC, abstractmethod

import numpy as np
import pandas as pd

from repro.datasets.property_graph import PropertyGraph
from repro.query.hiactor import _AdjIndex


class DataAccess(ABC):
    """Minimal LPG access surface the interactive queries need."""

    @abstractmethod
    def vertex(self, label: str, vid: int) -> dict | None: ...

    @abstractmethod
    def neighbors(self, vid: int, elabel: str, direction: str) -> np.ndarray: ...

    @abstractmethod
    def neighbors_with_prop(
        self, vid: int, elabel: str, direction: str, prop: str
    ) -> tuple[np.ndarray, np.ndarray]: ...

    @abstractmethod
    def find_vertices(self, label: str, prop: str, value) -> np.ndarray: ...

    # -- updates --------------------------------------------------------
    @abstractmethod
    def add_vertex(self, label: str, row: dict) -> None: ...

    @abstractmethod
    def add_edge(self, elabel: str, src: int, dst: int, props: dict) -> None: ...


class IndexedAccess(DataAccess):
    """HiActor-style: id-indexed property maps + sorted adjacency."""

    def __init__(self, pg: PropertyGraph):
        self._v = {l: p.set_index("id", drop=False) for l, p in pg.vertices.items()}
        self._adj: dict[tuple[str, str], _AdjIndex] = {}
        self._eprops: dict[str, list[str]] = {}
        for label, pdf in pg.edges.items():
            props = {c: pdf[c].to_numpy() for c in pdf.columns if c not in ("src", "dst")}
            self._eprops[label] = list(props)
            self._adj[(label, "out")] = _AdjIndex(pdf.src.to_numpy(), pdf.dst.to_numpy(), props)
            self._adj[(label, "in")] = _AdjIndex(pdf.dst.to_numpy(), pdf.src.to_numpy(), props)

    def vertex(self, label, vid):
        t = self._v[label]
        if vid not in t.index:
            return None
        return t.loc[vid].to_dict()

    def neighbors(self, vid, elabel, direction):
        if direction == "both":
            return np.concatenate(
                [self.neighbors(vid, elabel, "out"), self.neighbors(vid, elabel, "in")]
            )
        return self._adj[(elabel, direction)].neighbors(vid)

    def neighbors_with_prop(self, vid, elabel, direction, prop):
        if direction == "both":
            n1, p1 = self.neighbors_with_prop(vid, elabel, "out", prop)
            n2, p2 = self.neighbors_with_prop(vid, elabel, "in", prop)
            return np.concatenate([n1, n2]), np.concatenate([p1, p2])
        idx = self._adj[(elabel, direction)]
        sl = idx.slice(vid)
        return idx.nbrs[sl], idx.props[prop][sl]

    def find_vertices(self, label, prop, value):
        t = self._v[label]
        return t.index[t[prop] == value].to_numpy()

    def add_vertex(self, label, row):
        new = pd.DataFrame([row]).set_index("id", drop=False)
        self._v[label] = pd.concat([self._v[label], new])

    def add_edge(self, elabel, src, dst, props):
        # copy-on-write + atomic swap of the whole index object, so
        # concurrent readers always see a consistent snapshot (the
        # benchmark drives reads and updates from a worker pool)
        for direction, k, n in (("out", src, dst), ("in", dst, src)):
            old = self._adj[(elabel, direction)]
            pos = int(np.searchsorted(old.keys, k, "right"))
            new = _AdjIndex.__new__(_AdjIndex)
            new.keys = np.insert(old.keys, pos, k)
            new.nbrs = np.insert(old.nbrs, pos, n)
            new.props = {
                c: np.insert(old.props[c], pos, props.get(c, 0)) for c in old.props
            }
            self._adj[(elabel, direction)] = new


class ScanAccess(DataAccess):
    """Baseline: same data, no indexes — every access is a full scan."""

    def __init__(self, pg: PropertyGraph):
        self._v = {l: p.reset_index(drop=True) for l, p in pg.vertices.items()}
        self._e: dict[str, dict[str, np.ndarray]] = {}
        for label, pdf in pg.edges.items():
            self._e[label] = {c: pdf[c].to_numpy() for c in pdf.columns}

    def vertex(self, label, vid):
        t = self._v[label]
        hit = t[t.id.to_numpy() == vid]  # linear scan
        if not len(hit):
            return None
        return hit.iloc[0].to_dict()

    def neighbors(self, vid, elabel, direction):
        e = self._e[elabel]  # grab one consistent snapshot dict
        if direction == "both":
            return np.concatenate(
                [e["dst"][e["src"] == vid], e["src"][e["dst"] == vid]]
            )
        key, other = ("src", "dst") if direction == "out" else ("dst", "src")
        return e[other][e[key] == vid]

    def neighbors_with_prop(self, vid, elabel, direction, prop):
        e = self._e[elabel]
        if direction == "both":
            m1, m2 = e["src"] == vid, e["dst"] == vid
            return (
                np.concatenate([e["dst"][m1], e["src"][m2]]),
                np.concatenate([e[prop][m1], e[prop][m2]]),
            )
        key, other = ("src", "dst") if direction == "out" else ("dst", "src")
        mask = e[key] == vid
        return e[other][mask], e[prop][mask]

    def find_vertices(self, label, prop, value):
        t = self._v[label]
        return t.id.to_numpy()[t[prop].to_numpy() == value]

    def add_vertex(self, label, row):
        self._v[label] = pd.concat(
            [self._v[label], pd.DataFrame([row])], ignore_index=True
        )

    def add_edge(self, elabel, src, dst, props):
        # copy-on-write + atomic dict swap (see IndexedAccess.add_edge)
        old = self._e[elabel]
        new = {
            "src": np.append(old["src"], src),
            "dst": np.append(old["dst"], dst),
        }
        for c in old:
            if c not in ("src", "dst"):
                new[c] = np.append(old[c], props.get(c, 0))
        self._e[elabel] = new


# ---------------------------------------------------------------------------
# the workload: complex (C), short (S), update (U) queries
# ---------------------------------------------------------------------------
def c1_friends_in_city(da: DataAccess, person: int, city: str, k: int = 10):
    """Friends and friends-of-friends living in ``city`` (IC1-style)."""
    f1 = da.neighbors(person, "KNOWS", "out")
    f2 = np.unique(
        np.concatenate([da.neighbors(int(f), "KNOWS", "out") for f in f1])
        if len(f1)
        else np.empty(0, dtype=np.int64)
    )
    cand = np.setdiff1d(np.unique(np.concatenate([f1, f2])), [person])
    rows = []
    for c in cand:
        v = da.vertex("Person", int(c))
        if v and v["city"] == city:
            rows.append((int(c), v["name"]))
    rows.sort(key=lambda r: r[1])
    return rows[:k]


def c2_recent_posts(da: DataAccess, person: int, max_date: int, k: int = 10):
    """Latest posts created by friends, up to ``max_date`` (IC2-style)."""
    rows = []
    for f in da.neighbors(person, "KNOWS", "out"):
        for p in da.neighbors(int(f), "CREATED", "out"):
            v = da.vertex("Post", int(p))
            if v and v["creationDate"] <= max_date:
                rows.append((v["creationDate"], int(p), int(f)))
    rows.sort(reverse=True)
    return rows[:k]


def c3_city_counts(da: DataAccess, person: int):
    """City histogram of the 2-hop friendship neighborhood (IC3-style)."""
    f1 = da.neighbors(person, "KNOWS", "out")
    all_f = np.unique(
        np.concatenate([f1] + [da.neighbors(int(f), "KNOWS", "out") for f in f1])
        if len(f1)
        else np.empty(0, dtype=np.int64)
    )
    counts: dict[str, int] = {}
    for f in np.setdiff1d(all_f, [person]):
        v = da.vertex("Person", int(f))
        if v:
            counts[v["city"]] = counts.get(v["city"], 0) + 1
    return dict(sorted(counts.items()))


def c4_liked_length_avg(da: DataAccess, person: int):
    """Average length of posts liked by friends (IC4-flavoured)."""
    tot, n = 0, 0
    for f in da.neighbors(person, "KNOWS", "out"):
        for p in da.neighbors(int(f), "LIKES", "out"):
            v = da.vertex("Post", int(p))
            if v:
                tot += v["length"]
                n += 1
    return tot / n if n else 0.0


def c5_common_friends(da: DataAccess, person: int, k: int = 5):
    """2-hop candidates ranked by number of common friends (IC5-ish)."""
    f1 = set(da.neighbors(person, "KNOWS", "out").tolist())
    scores: dict[int, int] = {}
    for f in f1:
        for g in da.neighbors(int(f), "KNOWS", "out"):
            g = int(g)
            if g != person and g not in f1:
                scores[g] = scores.get(g, 0) + 1
    return sorted(scores.items(), key=lambda kv: (-kv[1], kv[0]))[:k]


def s1_profile(da: DataAccess, person: int):
    return da.vertex("Person", person)


def s2_last_posts(da: DataAccess, person: int, k: int = 5):
    posts = [da.vertex("Post", int(p)) for p in da.neighbors(person, "CREATED", "out")]
    posts = [p for p in posts if p]
    posts.sort(key=lambda p: -p["creationDate"])
    return posts[:k]


def s3_friends(da: DataAccess, person: int):
    nbrs, dates = da.neighbors_with_prop(person, "KNOWS", "out", "creationDate")
    return sorted(zip(nbrs.tolist(), dates.tolist()))


def s4_post(da: DataAccess, post: int):
    return da.vertex("Post", post)


def apply_update(da: DataAccess, ev: dict):
    if ev["kind"] == "add_person":
        da.add_vertex(
            "Person",
            {"id": ev["id"], "name": ev["name"], "city": ev["city"],
             "creationDate": ev["creationDate"]},
        )
    elif ev["kind"] == "add_like":
        da.add_edge("LIKES", ev["src"], ev["dst"], {"date": ev["date"]})
    else:
        da.add_edge("KNOWS", ev["src"], ev["dst"], {"creationDate": ev["creationDate"]})


COMPLEX = {"C1": c1_friends_in_city, "C2": c2_recent_posts, "C3": c3_city_counts,
           "C4": c4_liked_length_avg, "C5": c5_common_friends}
SHORT = {"S1": s1_profile, "S2": s2_last_posts, "S3": s3_friends, "S4": s4_post}


def make_workload(pg: PropertyGraph, *, n_ops: int = 200, seed: int = 17) -> list:
    """Seeded op mix (short-heavy, like the LDBC interactive driver)."""
    from repro.datasets import snb

    g = np.random.default_rng(seed)
    persons = pg.vertices["Person"].id.to_numpy()
    posts = pg.vertices["Post"].id.to_numpy()
    cities = pg.vertices["Person"].city.unique()
    updates = iter(snb.update_stream(pg, n_updates=n_ops, seed=seed + 1))
    ops = []
    # short-read-heavy mix, like the LDBC interactive driver's schedule
    for _ in range(n_ops):
        r = g.random()
        p = int(g.choice(persons))
        if r < 0.02:
            ops.append(("C1", lambda da, p=p, c=str(g.choice(cities)): c1_friends_in_city(da, p, c)))
        elif r < 0.04:
            ops.append(("C2", lambda da, p=p: c2_recent_posts(da, p, 2500)))
        elif r < 0.06:
            ops.append(("C3", lambda da, p=p: c3_city_counts(da, p)))
        elif r < 0.08:
            ops.append(("C4", lambda da, p=p: c4_liked_length_avg(da, p)))
        elif r < 0.10:
            ops.append(("C5", lambda da, p=p: c5_common_friends(da, p)))
        elif r < 0.35:
            ops.append(("S1", lambda da, p=p: s1_profile(da, p)))
        elif r < 0.55:
            ops.append(("S2", lambda da, p=p: s2_last_posts(da, p)))
        elif r < 0.75:
            ops.append(("S3", lambda da, p=p: s3_friends(da, p)))
        elif r < 0.90:
            ops.append(("S4", lambda da, q=int(g.choice(posts)): s4_post(da, q)))
        else:
            ev = next(updates)
            ops.append((f"U_{ev['kind']}", lambda da, ev=ev: apply_update(da, ev)))
    return ops
