"""LDBC SNB-lite: a scaled-down labeled-property-graph generator.

The paper runs the LDBC Social Network Benchmark (Interactive on
SNB-300, BI on SNB-1000).  The real datagen is a Hadoop job producing
hundreds of GB; here we generate a schema-faithful miniature with the
same *labels, properties, and correlation structure* the queries touch:

* ``Person(id, name, city, creationDate)``
* ``Post(id, creationDate, length)``
* ``Item(id, price, category)``     (e-commerce extension of Fig. 2)
* ``Account(id, riskScore)``        (fraud use case, Fig. 6(a))
* ``KNOWS(Person-Person, creationDate)`` — power-law (RMAT) friendship
* ``CREATED(Person->Post)``
* ``LIKES(Person->Post, date)``
* ``BUY(Account->Item, date, amount)``
* ``AKNOWS(Account-Account)``       (account-level social edges)

``snb_graph(n_persons=..)`` scales every other entity off ``n_persons``
with LDBC-like ratios.  ``update_stream`` yields seeded insert events
for the Interactive update queries (U*).
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from repro.datasets import graphs
from repro.datasets.property_graph import PropertyGraph

# Disjoint id ranges per label (paper: Vineyard internal-ID assignment).
PERSON_BASE = 0
POST_BASE = 1_000_000_000
ITEM_BASE = 2_000_000_000
ACCOUNT_BASE = 3_000_000_000

CITIES = ["beijing", "hangzhou", "shanghai", "london", "paris", "tokyo", "delhi", "lima"]
CATEGORIES = ["book", "toy", "phone", "shoe", "food", "game"]


def snb_graph(
    *,
    n_persons: int = 1000,
    seed: int = 0,
    posts_per_person: float = 3.0,
    likes_per_person: float = 8.0,
    knows_per_person: float = 10.0,
) -> PropertyGraph:
    """Generate the SNB-lite property graph, deterministic in ``seed``."""
    g = np.random.default_rng(seed)
    n_posts = max(1, int(n_persons * posts_per_person))
    n_items = max(1, n_persons // 2)
    n_accounts = n_persons  # one account per person, ids in ACCOUNT range

    pg = PropertyGraph()
    person_ids = np.arange(n_persons, dtype=np.int64) + PERSON_BASE
    pg.add_vertices(
        "Person",
        pd.DataFrame(
            {
                "id": person_ids,
                "name": [f"p{i:06d}" for i in range(n_persons)],
                "city": g.choice(CITIES, n_persons),
                "creationDate": g.integers(0, 3000, n_persons),
            }
        ),
    )
    post_ids = np.arange(n_posts, dtype=np.int64) + POST_BASE
    pg.add_vertices(
        "Post",
        pd.DataFrame(
            {
                "id": post_ids,
                "creationDate": g.integers(0, 3000, n_posts),
                "length": g.integers(1, 2000, n_posts),
            }
        ),
    )
    item_ids = np.arange(n_items, dtype=np.int64) + ITEM_BASE
    pg.add_vertices(
        "Item",
        pd.DataFrame(
            {
                "id": item_ids,
                "price": (g.random(n_items) * 500 + 1).round(2),
                "category": g.choice(CATEGORIES, n_items),
            }
        ),
    )
    account_ids = np.arange(n_accounts, dtype=np.int64) + ACCOUNT_BASE
    pg.add_vertices(
        "Account",
        pd.DataFrame({"id": account_ids, "riskScore": g.random(n_accounts).round(4)}),
    )

    # KNOWS: power-law via RMAT over the person id space, symmetrized.
    scale = max(2, int(np.ceil(np.log2(max(2, n_persons)))))
    knows = graphs.rmat_edges(
        scale=scale, n_edges=int(n_persons * knows_per_person), seed=seed + 1
    )
    knows = knows[(knows.src < n_persons) & (knows.dst < n_persons)]
    und = pd.concat(
        [knows, knows.rename(columns={"src": "dst", "dst": "src"})], ignore_index=True
    ).drop_duplicates()
    und = und.reset_index(drop=True)
    und["src"] += PERSON_BASE
    und["dst"] += PERSON_BASE
    und["creationDate"] = np.random.default_rng(seed + 2).integers(0, 3000, len(und))
    pg.add_edges("KNOWS", und, src_label="Person", dst_label="Person")

    # CREATED: each post has exactly one creator (skewed towards low ids).
    creators = (g.pareto(1.5, n_posts) % n_persons).astype(np.int64)
    pg.add_edges(
        "CREATED",
        pd.DataFrame({"src": creators + PERSON_BASE, "dst": post_ids}),
        src_label="Person",
        dst_label="Post",
    )

    # LIKES: persons like random posts.
    n_likes = int(n_persons * likes_per_person)
    likes = pd.DataFrame(
        {
            "src": g.integers(0, n_persons, n_likes) + PERSON_BASE,
            "dst": g.integers(0, n_posts, n_likes) + POST_BASE,
            "date": g.integers(0, 3000, n_likes),
        }
    ).drop_duplicates(["src", "dst"])
    pg.add_edges("LIKES", likes, src_label="Person", dst_label="Post")

    # BUY: accounts buy zipf-popular items (e-commerce skew).
    n_buys = n_persons * 5
    ranks = np.arange(1, n_items + 1)
    w = 1.0 / ranks**1.1
    w /= w.sum()
    buys = pd.DataFrame(
        {
            "src": g.integers(0, n_accounts, n_buys) + ACCOUNT_BASE,
            "dst": g.choice(ranks - 1, n_buys, p=w) + ITEM_BASE,
            "date": g.integers(0, 3000, n_buys),
            "amount": (g.random(n_buys) * 100 + 1).round(2),
        }
    ).drop_duplicates(["src", "dst"])
    pg.add_edges("BUY", buys, src_label="Account", dst_label="Item")

    # AKNOWS mirrors KNOWS at the account level (same topology).
    ak = und[["src", "dst"]].copy()
    ak["src"] = ak["src"] - PERSON_BASE + ACCOUNT_BASE
    ak["dst"] = ak["dst"] - PERSON_BASE + ACCOUNT_BASE
    pg.add_edges("AKNOWS", ak, src_label="Account", dst_label="Account")
    return pg


def update_stream(pg: PropertyGraph, *, n_updates: int = 100, seed: int = 99) -> list[dict]:
    """Seeded insert events for the Interactive update queries.

    Three event kinds, mirroring LDBC U1/U2/U3: add-person, add-like,
    add-knows.  Ids continue past the existing ranges so inserts never
    collide with generated data.
    """
    g = np.random.default_rng(seed)
    persons = pg.vertices["Person"].id.to_numpy()
    posts = pg.vertices["Post"].id.to_numpy()
    next_person = int(persons.max()) + 1
    events: list[dict] = []
    for i in range(n_updates):
        kind = ("add_person", "add_like", "add_knows")[int(g.integers(0, 3))]
        if kind == "add_person":
            events.append(
                {
                    "kind": kind,
                    "id": next_person,
                    "name": f"u{i:06d}",
                    "city": CITIES[int(g.integers(0, len(CITIES)))],
                    "creationDate": 3000 + i,
                }
            )
            next_person += 1
        elif kind == "add_like":
            events.append(
                {
                    "kind": kind,
                    "src": int(g.choice(persons)),
                    "dst": int(g.choice(posts)),
                    "date": 3000 + i,
                }
            )
        else:
            a, b = g.choice(persons, 2, replace=False)
            events.append(
                {"kind": kind, "src": int(a), "dst": int(b), "creationDate": 3000 + i}
            )
    return events
