"""Driver-side end-to-end checks of the partial-evaluation framework:

    DISTINCT oracle matches  ==  local matches ∪ assembled crossing matches

on randomized graphs and partitionings, plus pruning soundness (Algorithm 2
never removes a PM that contributes to a final match).
"""
import numpy as np
import pytest

from repro.core.lec import LECFeature
from repro.core.partial_eval import enumerate_local_pms
from repro.core.pruning import prune_features, surviving_feature_keys
from repro.core.query import Query
from repro.rdf.datasets import paper_example
from repro.rdf.graph import fragment_edges_pdf
from tests.helpers import (
    local_matches,
    oracle_rows,
    random_partition,
    random_triples,
    reference_assemble,
)

QUERIES = [
    Query([("?a", "p", "?b"), ("?b", "q", "?c")], name="path2"),
    Query(
        [("?a", "p", "?b"), ("?b", "q", "?c"), ("?c", "r", "?a")],
        name="triangle",
    ),
    Query([("?a", "p", "?b"), ("?c", "q", "?b")], name="in-join"),
    Query(
        [("?a", "p", "?b"), ("?b", "q", "?c"), ("?b", "r", "?d")],
        name="tree",
    ),
    Query([("?a", "?x", "?b"), ("?b", "q", "?c")], name="pred-var"),
]


def all_pms(triples, vfrag, query, k):
    fe = fragment_edges_pdf(triples, vfrag)
    pms = []
    for frag in range(k):
        sub = fe[fe["frag"] == frag]
        rows = [
            tuple(r)
            for r in sub[["s", "p", "o", "s_frag", "o_frag"]].itertuples(
                index=False
            )
        ]
        pms += enumerate_local_pms(rows, frag, query)
    return pms


@pytest.mark.parametrize("seed", range(5))
@pytest.mark.parametrize("query", QUERIES, ids=lambda q: q.name)
def test_local_plus_assembled_equals_oracle(seed, query):
    rng = np.random.default_rng(seed)
    triples = random_triples(rng, n_vertices=12, n_edges=34)
    vfrag = random_partition(rng, triples, k=3)
    pms = all_pms(triples, vfrag, query, 3)
    got = local_matches(triples, vfrag, query) | reference_assemble(pms, query)
    assert got == oracle_rows(triples, query)


def test_paper_example_end_to_end():
    triples, vfrag, query = paper_example()
    pms = all_pms(triples, vfrag, query, 3)
    assert len(pms) == 8  # Fig 3
    crossing = reference_assemble(pms, query)
    want = oracle_rows(triples, query)
    # Example 3's crossing match is among them
    assert ("006", "008", "001", "009") in {
        tuple(m) for m in crossing
    } or ("006", "008", "001", "009") in crossing
    assert crossing | local_matches(triples, vfrag, query) == want
    assert len(want) == 4


@pytest.mark.parametrize("seed", range(5))
@pytest.mark.parametrize(
    "query", QUERIES[:3], ids=lambda q: q.name
)
def test_pruning_preserves_assembled_matches(seed, query):
    rng = np.random.default_rng(50 + seed)
    triples = random_triples(rng, n_vertices=12, n_edges=34)
    vfrag = random_partition(rng, triples, k=3)
    pms = all_pms(triples, vfrag, query, 3)
    feats = sorted(
        {
            LECFeature(pm["frag"], tuple(pm["cmap"]), pm["sign"])
            for pm in pms
        },
        key=lambda f: (f.frag, f.cmap, f.sign),
    )
    res = prune_features(feats, query.full_sign)
    assert res.complete
    keys = surviving_feature_keys(feats, res)
    kept = [
        pm
        for pm in pms
        if (pm["frag"], pm["sign"], tuple(pm["cmap"])) in keys
    ]
    assert reference_assemble(kept, query) == reference_assemble(pms, query)


@pytest.mark.parametrize("seed", range(3))
def test_pruning_guard_is_sound(seed):
    """With max_states=1 the guard trips and keeps everything."""
    rng = np.random.default_rng(seed)
    triples = random_triples(rng)
    vfrag = random_partition(rng, triples, k=3)
    query = QUERIES[0]
    pms = all_pms(triples, vfrag, query, 3)
    feats = sorted(
        {LECFeature(pm["frag"], tuple(pm["cmap"]), pm["sign"]) for pm in pms},
        key=lambda f: (f.frag, f.cmap, f.sign),
    )
    if not feats:
        pytest.skip("no features at this seed")
    res = prune_features(feats, query.full_sign, max_states=1)
    assert not res.complete
    assert res.surviving == set(range(len(feats)))
