"""Property tests for the Definition-5 enumerator on randomized graphs."""
import numpy as np
import pytest

from repro.core.partial_eval import enumerate_local_pms
from repro.core.query import Query
from repro.rdf.graph import fragment_edges_pdf
from tests.helpers import (
    check_def5,
    oracle_rows,
    random_partition,
    random_triples,
)

QUERIES = [
    Query([("?a", "p", "?b"), ("?b", "q", "?c")], name="path2"),
    Query(
        [("?a", "p", "?b"), ("?b", "q", "?c"), ("?c", "r", "?a")],
        name="triangle",
    ),
    Query([("?a", "p", "?b"), ("?a", "q", "?c")], name="out-star"),
    Query([("?a", "p", "?b"), ("?c", "q", "?b")], name="in-join"),
    Query([("?a", "?x", "?b"), ("?b", "q", "?c")], name="pred-var"),
    Query([("?a", "p", "n1"), ("?a", "q", "?b")], name="const-anchor"),
]


def fragment_rows(fe, frag):
    sub = fe[fe["frag"] == frag]
    return [
        tuple(r)
        for r in sub[["s", "p", "o", "s_frag", "o_frag"]].itertuples(index=False)
    ]


@pytest.mark.parametrize("seed", range(6))
@pytest.mark.parametrize("query", QUERIES, ids=lambda q: q.name)
def test_all_pms_satisfy_def5(seed, query):
    rng = np.random.default_rng(seed)
    triples = random_triples(rng, n_vertices=12, n_edges=36)
    vfrag = random_partition(rng, triples, k=3)
    fe = fragment_edges_pdf(triples, vfrag)
    total = 0
    for frag in range(3):
        rows = fragment_rows(fe, frag)
        for pm in enumerate_local_pms(rows, frag, query):
            check_def5(pm, query, rows, frag)
            total += 1
    # random graphs at this density virtually always produce some PMs;
    # the assertion guards against a silently-empty enumerator
    assert total > 0


@pytest.mark.parametrize("seed", range(3))
def test_enumerator_deterministic(seed):
    rng = np.random.default_rng(seed)
    triples = random_triples(rng)
    vfrag = random_partition(rng, triples, k=3)
    fe = fragment_edges_pdf(triples, vfrag)
    query = QUERIES[0]
    rows = fragment_rows(fe, 0)
    a = enumerate_local_pms(rows, 0, query)
    b = enumerate_local_pms(rows, 0, query)
    assert a == b


def test_single_fragment_has_no_pms():
    """With everything in one fragment there are no crossing edges, hence
    no local partial matches (condition 4)."""
    rng = np.random.default_rng(0)
    triples = random_triples(rng)
    vfrag = random_partition(rng, triples, k=1)
    fe = fragment_edges_pdf(triples, vfrag)
    rows = fragment_rows(fe, 0)
    assert enumerate_local_pms(rows, 0, QUERIES[0]) == []


@pytest.mark.parametrize("seed", range(4))
def test_match_decomposition_appears_as_pms(seed):
    """Every oracle match spanning ≥2 fragments must decompose into PMs
    that the enumerator found (completeness, the heart of [18]'s Prop.)."""
    rng = np.random.default_rng(100 + seed)
    triples = random_triples(rng, n_vertices=10, n_edges=30)
    vfrag = random_partition(rng, triples, k=3)
    home = dict(zip(vfrag["v"], vfrag["frag"]))
    fe = fragment_edges_pdf(triples, vfrag)
    query = Query([("?a", "p", "?b"), ("?b", "q", "?c")], name="path2")
    pms = {
        frag: enumerate_local_pms(fragment_rows(fe, frag), frag, query)
        for frag in range(3)
    }
    sers = {
        frag: {tuple(pm[f"m_{i}"] for i in range(3)) for pm in pms[frag]}
        for frag in range(3)
    }
    for a, b, c in oracle_rows(triples, query):
        binding = [a, b, c]
        frags = {home[v] for v in binding}
        if len(frags) == 1:
            continue  # purely local match — never a PM
        edges = [(0, 1), (1, 2)]  # query-vertex index pairs of path2
        for frag in frags:
            # Condition 6 splits the overlap of the match with a fragment
            # into one PM per internally-connected component.
            internal = {i for i, v in enumerate(binding) if home[v] == frag}
            comp_adj = {i: set() for i in internal}
            for si, oi in edges:
                if si in internal and oi in internal:
                    comp_adj[si].add(oi)
                    comp_adj[oi].add(si)
            seen: set[int] = set()
            for root in sorted(internal):
                if root in seen:
                    continue
                comp = {root}
                stack = [root]
                while stack:
                    for w in comp_adj[stack.pop()]:
                        if w not in comp:
                            comp.add(w)
                            stack.append(w)
                seen |= comp
                proj = [None, None, None]
                crossing = False
                for si, oi in edges:
                    if si in comp or oi in comp:
                        proj[si] = binding[si]
                        proj[oi] = binding[oi]
                        if home[binding[si]] != home[binding[oi]]:
                            crossing = True
                if not crossing:
                    continue  # component touches no crossing edge
                assert tuple(proj) in sers[frag], (
                    f"missing PM {proj} in fragment {frag}"
                )
