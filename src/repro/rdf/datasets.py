"""Synthetic RDF datasets standing in for LUBM / YAGO2 / BTC (§VIII-A).

The paper evaluates on 15–176 GB datasets; we generate structurally
analogous graphs at laptop scale (see DESIGN.md §3 for the substitution
argument). All generators are deterministic in ``seed`` and return a pandas
``DataFrame(s, p, o)`` — small enough to register directly with the DuckDB
oracle and to lift into Spark with :func:`to_spark`.

URI convention: ``ns:domain:rest`` — the first two ``:``-segments are the
*semantic domain* used by semantic-hash partitioning. LUBM-lite URIs embed
the university (``lubm:U3:...``) so semantic hashing co-locates whole
universities; YAGO2-lite URIs are flat (``yago:p12``) so semantic hashing
degenerates to plain hashing, as the paper observes for YAGO2.

Also ships :func:`paper_example`: the exact running example of Figs 1–3
(distributed graph G, query Q, fragments F1–F3), against which the unit
tests assert the paper's PM / LEC-feature / group / pruning results.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from repro.core.query import Query

TRIPLE_COLS = ["s", "p", "o"]


def to_spark(spark: SparkSession, triples_pdf: pd.DataFrame) -> DataFrame:
    """Lift a pandas triple table into Spark with the canonical schema."""
    return spark.createDataFrame(triples_pdf[TRIPLE_COLS].astype(str))


def _df(rows: list[tuple[str, str, str]]) -> pd.DataFrame:
    pdf = pd.DataFrame(rows, columns=TRIPLE_COLS).drop_duplicates()
    return pdf.reset_index(drop=True)


# ---------------------------------------------------------------------------
# LUBM-lite
# ---------------------------------------------------------------------------

def lubm(*, universities: int = 5, seed: int = 7) -> pd.DataFrame:
    """University-domain generator (LUBM stand-in).

    Per university: 3 departments; per department: 6 professors, 8 graduate
    students, 15 undergraduates, 4 courses + 3 graduate courses. The only
    cross-university edges are ``undergraduateDegreeFrom`` /
    ``doctoralDegreeFrom`` (sampled for ~25% of people), so semantic-hash
    partitioning produces a small, hub-concentrated cut while hash
    partitioning cuts almost every edge — the §VIII-D contrast.

    ``undergraduateDegreeFrom`` points back at the student's *own*
    university with probability 0.12, planting the LQ1 triangle matches.
    """
    g = np.random.default_rng(seed)
    rows: list[tuple[str, str, str]] = []
    unis = [f"lubm:U{i}" for i in range(max(2, universities))]
    for ui, uni in enumerate(unis):
        for d in range(3):
            dept = f"{uni}:D{d}"
            rows.append((dept, "ub:subOrganizationOf", uni))
            courses = [f"{uni}:D{d}:C{c}" for c in range(4)]
            gcourses = [f"{uni}:D{d}:GC{c}" for c in range(3)]
            profs = []
            for kind, cnt in (("FP", 2), ("AP", 2), ("AS", 2)):
                for n in range(cnt):
                    prof = f"{uni}:D{d}:{kind}{n}"
                    profs.append(prof)
                    rows.append((prof, "ub:worksFor", dept))
                    rows.append((prof, "ub:name", f"{uni}:lit:nm:{kind}{n}D{d}"))
                    rows.append((prof, "ub:emailAddress", f"{uni}:lit:em:{kind}{n}D{d}"))
                    if g.random() < 0.25:
                        rows.append(
                            (prof, "ub:doctoralDegreeFrom", unis[g.integers(len(unis))])
                        )
            for ci, course in enumerate(courses + gcourses):
                rows.append((profs[ci % len(profs)], "ub:teacherOf", course))
            for n in range(8):
                stu = f"{uni}:D{d}:GS{n}"
                rows.append((stu, "ub:memberOf", dept))
                rows.append((stu, "ub:advisor", profs[int(g.integers(len(profs)))]))
                for c in g.choice(3, size=2, replace=False):
                    rows.append((stu, "ub:takesCourse", gcourses[c]))
                if g.random() < 0.25:
                    target = uni if g.random() < 0.12 else unis[g.integers(len(unis))]
                    rows.append((stu, "ub:undergraduateDegreeFrom", target))
            for n in range(15):
                stu = f"{uni}:D{d}:US{n}"
                rows.append((stu, "ub:memberOf", dept))
                for c in g.choice(4, size=2, replace=False):
                    rows.append((stu, "ub:takesCourse", courses[c]))
    return _df(rows)


# ---------------------------------------------------------------------------
# YAGO2-lite
# ---------------------------------------------------------------------------

def yago2(*, persons: int = 400, seed: int = 11) -> pd.DataFrame:
    """Wikipedia-style entity graph (YAGO2 stand-in), one flat namespace.

    Plants: 17 married couples both born in ``yago:city0`` (YQ1's answer);
    actor-directors born only in ``yago:city3`` so YQ2 (anchored at
    ``yago:city1``) is empty while its candidate sets are not.
    """
    g = np.random.default_rng(seed)
    persons = max(80, persons)
    n_cities = max(8, persons // 20)
    n_countries = 8
    n_movies = max(10, persons // 4)
    n_unis = max(4, persons // 40)
    rows: list[tuple[str, str, str]] = []

    cities = [f"yago:city{i}" for i in range(n_cities)]
    for i, city in enumerate(cities):
        rows.append((city, "y:isLocatedIn", f"yago:country{i % n_countries}"))

    people = [f"yago:p{i}" for i in range(persons)]
    # reserve the first 34 people as YQ1's planted couples
    for i in range(17):
        a, b = people[2 * i], people[2 * i + 1]
        rows.append((a, "y:isMarriedTo", b))
        rows.append((a, "y:wasBornIn", cities[0]))
        rows.append((b, "y:wasBornIn", cities[0]))
    for i, p in enumerate(people):
        rows.append((p, "y:hasFamilyName", f"yago:fam{i % 97}"))
        rows.append((p, "y:livesIn", cities[int(g.integers(n_cities))]))
        if i >= 34:  # non-planted people are never born in city0
            born = cities[1 + int(g.integers(n_cities - 1))]
            rows.append((p, "y:wasBornIn", born))
        if g.random() < 0.5:
            rows.append((p, "y:graduatedFrom", f"yago:uni{int(g.integers(n_unis))}"))
        if g.random() < 0.3:
            for m in g.choice(n_movies, size=int(g.integers(1, 3)), replace=False):
                rows.append((p, "y:actedIn", f"yago:movie{m}"))
        if 34 <= i and g.random() < 0.25:  # extra marriages away from city0
            rows.append((p, "y:isMarriedTo", people[int(g.integers(34, persons))]))
    # actor-directors: born in city3 only (keeps YQ2 empty but non-trivial)
    for i in range(5):
        p = f"yago:ad{i}"
        m = f"yago:movie{i}"
        rows.append((p, "y:actedIn", m))
        rows.append((p, "y:directed", m))
        rows.append((p, "y:wasBornIn", cities[3]))
        rows.append((p, "y:livesIn", cities[int(g.integers(n_cities))]))
    # a few pure directors
    for i in range(5, 15):
        p = f"yago:dir{i}"
        rows.append((p, "y:directed", f"yago:movie{i % n_movies}"))
        rows.append((p, "y:wasBornIn", cities[1 + i % (n_cities - 1)]))
    return _df(rows)


# ---------------------------------------------------------------------------
# BTC-lite
# ---------------------------------------------------------------------------

def btc(*, persons_per_pub: int = 120, publishers: int = 6, seed: int = 13) -> pd.DataFrame:
    """Heterogeneous multi-publisher web graph (BTC stand-in).

    ``foaf:knows`` edges are strictly layered (layer = person index mod 3,
    edges only 0→1 and 1→2), so the BQ7 triangle query has zero matches even
    though every middle-layer person has both in- and out-``knows`` edges
    (non-empty candidates → real partial-evaluation work). Only documents
    carry ``geo:located``, keeping BQ6 empty as well.

    Plants: ``btc_alice`` (BQ1, 1 match), ``btc_bob`` knowing exactly two
    people (BQ2), 4 (x, y) knows-chains into ``pub0:P:0`` where x has a
    homepage (BQ4), and 3 authors × 4 documents around ``pub0:P:1`` (BQ5).
    """
    g = np.random.default_rng(seed)
    persons_per_pub = max(40, persons_per_pub)
    rows: list[tuple[str, str, str]] = []
    people: list[str] = []
    for pub in range(publishers):
        people += [f"pub{pub}:P:{n}" for n in range(persons_per_pub)]

    def layer(p: str) -> int:
        return int(p.rsplit(":", 1)[1]) % 3

    # planted targets must not receive random edges
    reserved_objects = {"pub0:P:0", "pub0:P:1"}
    reserved_mid = [f"pub0:P:{i}" for i in (4, 7, 10, 13, 16)]  # layer 1
    reserved_objects.update(reserved_mid)
    bq4_xs = [f"pub3:P:{i}" for i in (0, 3, 6, 9)]  # layer 0, get 1 homepage each

    by_layer: dict[int, list[str]] = {0: [], 1: [], 2: []}
    for p in people:
        by_layer[layer(p)].append(p)

    for p in people:
        lay = layer(p)
        if lay < 2 and p not in reserved_objects:
            targets = [t for t in by_layer[lay + 1] if t not in reserved_objects]
            for t in g.choice(len(targets), size=2, replace=False):
                rows.append((p, "foaf:knows", targets[t]))
        rows.append((p, "foaf:name", f"{p.rsplit(':', 1)[0]}:lit:nm{p.rsplit(':', 1)[1]}"))
        # bq4_xs get exactly one (planted) homepage so BQ4 has exactly 4 rows
        if g.random() < 0.3 and p not in bq4_xs:
            rows.append((p, "foaf:homepage", f"{p.rsplit(':', 1)[0]}:lit:hp{p.rsplit(':', 1)[1]}"))
    # documents: creator + location (reserved people never author random docs,
    # keeping BQ5's planted 12 exact)
    n_places = 25
    free_people = [p for p in people if p not in reserved_objects]
    for pub in range(publishers):
        for n in range(persons_per_pub // 3):
            doc = f"pub{pub}:Doc:{n}"
            author = free_people[int(g.integers(len(free_people)))]
            rows.append((doc, "dc:creator", author))
            rows.append((doc, "geo:located", f"geo:Pl:{int(g.integers(n_places))}"))

    # ---- planted answers -------------------------------------------------
    rows.append(("pub1:P:alice", "foaf:name", "btc_alice"))
    rows.append(("pub1:P:alice", "foaf:homepage", "pub1:P:lit:hpalice"))
    rows.append(("pub2:P:bob", "foaf:name", "btc_bob"))
    rows.append(("pub2:P:bob", "foaf:knows", "pub2:P:1"))
    rows.append(("pub2:P:bob", "foaf:knows", "pub2:P:4"))
    # BQ4: 4 chains x -> y -> pub0:P:0 with x having a homepage
    ys = reserved_mid[:2]
    for y in ys:
        rows.append((y, "foaf:knows", "pub0:P:0"))
    xs = bq4_xs
    for i, x in enumerate(xs):
        rows.append((x, "foaf:knows", ys[i % 2]))
        rows.append((x, "foaf:homepage", f"pub3:P:lit:hpx{i}"))
    # avoid double-pairing: x0,x2 -> y0 ; x1,x3 -> y1  → exactly 4 (x, y)
    # BQ5: 3 authors knowing pub0:P:1, each wrote 4 docs → 12 matches
    authors = reserved_mid[2:5]
    for ai, a in enumerate(authors):
        rows.append((a, "foaf:knows", "pub0:P:1"))
        for d in range(4):
            doc = f"pub0:Doc:b5_{ai}_{d}"
            rows.append((doc, "dc:creator", a))
            rows.append((doc, "geo:located", f"geo:Pl:{d}"))
    return _df(rows)


# ---------------------------------------------------------------------------
# Paper running example (Figs 1–3)
# ---------------------------------------------------------------------------

def paper_example() -> tuple[pd.DataFrame, pd.DataFrame, Query]:
    """The distributed graph G, partitioning and query Q of Figs 1–2.

    Reconstructed so that partial evaluation yields exactly the eight local
    partial matches of Fig 3 and the seven LEC features of Example 6.
    Fragments are 0-indexed: fragment ``i`` here is the paper's ``F_{i+1}``.
    Vertex order is pinned to (v1=?p2, v2=?t, v3=?p1, v4=?l, v5="003") so
    LECSign bitstrings match the paper literally.
    """
    triples = _df(
        [
            ("001", "name", "003"),
            ("001", "influencedBy", "006"),
            ("001", "influencedBy", "012"),
            ("006", "mainInterest", "008"),
            ("008", "label", "009"),
            ("006", "mainInterest", "010"),
            ("010", "label", "011"),
            ("006", "mainInterest", "005"),
            ("005", "label", "004"),
            ("012", "mainInterest", "015"),
            ("015", "label", "016"),
            ("014", "mainInterest", "013"),
            ("013", "label", "017"),
        ]
    )
    frag_map = {
        "001": 0, "003": 0, "004": 0, "005": 0,
        "006": 1, "008": 1, "009": 1, "010": 1, "011": 1, "014": 1,
        "012": 2, "013": 2, "015": 2, "016": 2, "017": 2,
    }
    vertex_frag = pd.DataFrame(
        {"v": list(frag_map), "frag": list(frag_map.values())}
    ).astype({"frag": "int32"})
    query = Query(
        [
            ("?t", "label", "?l"),
            ("?p1", "influencedBy", "?p2"),
            ("?p2", "mainInterest", "?t"),
            ("?p1", "name", "003"),
        ],
        name="paper-example",
        vertex_order=["?p2", "?t", "?p1", "?l", "003"],
    )
    return triples, vertex_frag, query
