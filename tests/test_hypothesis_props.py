"""Hypothesis property tests for the pure-Python layers."""
import pandas as pd
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core.lec import LECFeature, feature_groups, joinable, maps_compatible
from repro.core.partial_eval import candidate_bit
from repro.core.query import Query
from tests.helpers import oracle_rows

verts = st.sampled_from([f"n{i}" for i in range(8)])
preds = st.sampled_from(["p", "q"])
triple = st.tuples(verts, preds, verts).filter(lambda t: t[0] != t[2])


@given(st.lists(triple, min_size=1, max_size=40), st.integers(0, 1))
@settings(max_examples=40, deadline=None)
def test_single_pattern_oracle_matches_manual(rows, pi):
    pdf = pd.DataFrame(sorted(set(rows)), columns=["s", "p", "o"])
    pred = ["p", "q"][pi]
    q = Query([("?s", pred, "?o")])
    got = oracle_rows(pdf, q)
    want = {
        (s, o) for s, p, o in pdf.itertuples(index=False) if p == pred
    }
    assert got == want


@given(st.text(min_size=0, max_size=30), st.sampled_from([64, 512, 4096]))
@settings(max_examples=60, deadline=None)
def test_candidate_bit_in_range_and_stable(v, bitlen):
    b = candidate_bit(v, bitlen)
    assert 0 <= b < bitlen
    assert b == candidate_bit(v, bitlen)


entries = st.lists(
    st.tuples(st.integers(0, 3), st.sampled_from(["e1", "e2", "e3"])),
    min_size=1,
    max_size=3,
    unique_by=lambda t: t[0],
).map(lambda ts: tuple(sorted(f"{q}##{e}" for q, e in ts)))

features = st.builds(
    LECFeature,
    frag=st.integers(0, 3),
    cmap=entries,
    sign=st.integers(1, 15),
)


@given(features, features)
@settings(max_examples=80, deadline=None)
def test_joinable_symmetric(a, b):
    assert joinable(a, b) == joinable(b, a)


@given(features, features)
@settings(max_examples=80, deadline=None)
def test_theorem5_property(a, b):
    if a.sign == b.sign:
        assert not joinable(a, b)


@given(st.lists(features, max_size=12))
@settings(max_examples=40, deadline=None)
def test_feature_groups_partition(fs):
    groups = feature_groups(fs)
    flat = [f for g in groups.values() for f in g]
    assert sorted(flat, key=id) == sorted(fs, key=id) or len(flat) == len(fs)
    for sign, members in groups.items():
        assert all(m.sign == sign for m in members)


@given(features, features)
@settings(max_examples=80, deadline=None)
def test_maps_compatible_consistency(a, b):
    shared, ok = maps_compatible(a.qe_map(), b.qe_map())
    shared2, ok2 = maps_compatible(b.qe_map(), a.qe_map())
    assert (shared, ok) == (shared2, ok2)
    if shared:
        assert set(a.cmap) & set(b.cmap)
