"""Benchmark queries LQ1–LQ7, YQ1–YQ4, BQ1–BQ7 (§VIII-A).

The exact query text of [1]/[18] targets the real LUBM/YAGO2/BTC schemas;
here each query reproduces the *shape class* of its table row instead
(DESIGN.md §3): star vs complex structure, selective (√ in Tables I/III)
vs unselective, and zero / small / large result cardinality. Every query's
constants exist at every generator scale.
"""
from __future__ import annotations

from repro.core.query import Query

# --- LUBM-lite (Table I) ---------------------------------------------------

LUBM_QUERIES: dict[str, Query] = {
    # complex (triangle), unselective, few matches, many PMs — paper LQ1
    "LQ1": Query(
        [
            ("?x", "ub:memberOf", "?d"),
            ("?d", "ub:subOrganizationOf", "?u"),
            ("?x", "ub:undergraduateDegreeFrom", "?u"),
        ],
        name="LQ1",
        selective=False,
    ),
    # star, unselective, many matches — paper LQ2
    "LQ2": Query(
        [
            ("?x", "ub:takesCourse", "?c"),
            ("?x", "ub:memberOf", "?d"),
        ],
        name="LQ2",
        selective=False,
    ),
    # complex, selective, zero matches (ontology mismatch: staff have no
    # undergraduate degree) — paper LQ3
    "LQ3": Query(
        [
            ("?x", "ub:worksFor", "?d"),
            ("?d", "ub:subOrganizationOf", "lubm:U0"),
            ("?x", "ub:undergraduateDegreeFrom", "lubm:U0"),
        ],
        name="LQ3",
        selective=True,
    ),
    # star, selective, ~6 matches — paper LQ4
    "LQ4": Query(
        [
            ("?p", "ub:worksFor", "lubm:U0:D0"),
            ("?p", "ub:name", "?n"),
            ("?p", "ub:emailAddress", "?e"),
        ],
        name="LQ4",
        selective=True,
    ),
    # star, selective, ~8 matches — paper LQ5
    "LQ5": Query(
        [
            ("?x", "ub:memberOf", "lubm:U0:D0"),
            ("?x", "ub:advisor", "?y"),
        ],
        name="LQ5",
        selective=True,
    ),
    # complex (path), selective, small result — paper LQ6. Every pattern is
    # narrowed by 1-hop candidate signatures (memberOf∧uDF → graduate
    # students with a degree edge; ?d is anchored to U1's departments), so
    # the PM count stays small like the paper's 228.
    "LQ6": Query(
        [
            ("?x", "ub:memberOf", "?d"),
            ("?d", "ub:subOrganizationOf", "lubm:U1"),
            ("?x", "ub:undergraduateDegreeFrom", "?u"),
        ],
        name="LQ6",
        selective=True,
    ),
    # complex (path), unselective, many matches — paper LQ7
    "LQ7": Query(
        [
            ("?p", "ub:teacherOf", "?c"),
            ("?x", "ub:takesCourse", "?c"),
        ],
        name="LQ7",
        selective=False,
    ),
}

# --- YAGO2-lite (Table II) -------------------------------------------------

YAGO_QUERIES: dict[str, Query] = {
    # selective, planted 17 matches — paper YQ1
    "YQ1": Query(
        [
            ("?a", "y:isMarriedTo", "?b"),
            ("?a", "y:wasBornIn", "yago:city0"),
            ("?b", "y:wasBornIn", "yago:city0"),
        ],
        name="YQ1",
        selective=True,
    ),
    # selective, zero matches with non-empty candidates — paper YQ2
    "YQ2": Query(
        [
            ("?a", "y:actedIn", "?m"),
            ("?a", "y:directed", "?m"),
            ("?a", "y:wasBornIn", "yago:city1"),
        ],
        name="YQ2",
        selective=True,
    ),
    # unselective, the heavy row (dominant PM count and assembly time) —
    # paper YQ3
    "YQ3": Query(
        [
            ("?a", "y:livesIn", "?c"),
            ("?b", "y:livesIn", "?c"),
        ],
        name="YQ3",
        selective=False,
    ),
    # moderately selective, mid-size result — paper YQ4
    "YQ4": Query(
        [
            ("?p", "y:graduatedFrom", "?u"),
            ("?p", "y:livesIn", "?c"),
            ("?c", "y:isLocatedIn", "yago:country0"),
        ],
        name="YQ4",
        selective=True,
    ),
}

# --- BTC-lite (Table III) --------------------------------------------------

BTC_QUERIES: dict[str, Query] = {
    # star, selective, 1 match — paper BQ1
    "BQ1": Query(
        [
            ("?x", "foaf:name", "btc_alice"),
            ("?x", "foaf:homepage", "?h"),
        ],
        name="BQ1",
        selective=True,
    ),
    # star, selective, 2 matches — paper BQ2
    "BQ2": Query(
        [
            ("?x", "foaf:name", "btc_bob"),
            ("?x", "foaf:knows", "?y"),
        ],
        name="BQ2",
        selective=True,
    ),
    # star, selective, 0 matches — paper BQ3
    "BQ3": Query(
        [
            ("?x", "foaf:name", "btc_nobody"),
            ("?x", "foaf:homepage", "?h"),
        ],
        name="BQ3",
        selective=True,
    ),
    # complex, selective, planted 4 matches — paper BQ4
    "BQ4": Query(
        [
            ("?x", "foaf:knows", "?y"),
            ("?y", "foaf:knows", "pub0:P:0"),
            ("?x", "foaf:homepage", "?h"),
        ],
        name="BQ4",
        selective=True,
    ),
    # complex, selective, planted 12 matches — paper BQ5
    "BQ5": Query(
        [
            ("?d", "dc:creator", "?y"),
            ("?y", "foaf:knows", "pub0:P:1"),
        ],
        name="BQ5",
        selective=True,
    ),
    # complex, unselective, 0 matches (empty candidate intersection:
    # people are never geo-located) — paper BQ6
    "BQ6": Query(
        [
            ("?x", "foaf:knows", "?y"),
            ("?y", "geo:located", "?l"),
        ],
        name="BQ6",
        selective=False,
    ),
    # complex (triangle), unselective, 0 matches over a layered (triangle-
    # free) knows graph with non-trivial candidates — paper BQ7
    "BQ7": Query(
        [
            ("?x", "foaf:knows", "?y"),
            ("?y", "foaf:knows", "?z"),
            ("?z", "foaf:knows", "?x"),
        ],
        name="BQ7",
        selective=False,
    ),
}

ALL_QUERIES: dict[str, dict[str, Query]] = {
    "lubm": LUBM_QUERIES,
    "yago2": YAGO_QUERIES,
    "btc": BTC_QUERIES,
}
