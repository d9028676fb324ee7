"""Focused unit tests for Algorithm 2 (pruning) on handcrafted features."""
from repro.core.lec import LECFeature, feature_groups, joinable
from repro.core.pruning import prune_features, surviving_feature_keys

E1 = "0##a|p|b"  # crossing edge a->b mapped to query edge 0
E2 = "1##b|q|c"


def test_complementary_pair_survives():
    # full sign for a 3-vertex query is 0b111
    f1 = LECFeature(0, (E1,), 0b001)
    f2 = LECFeature(1, (E1,), 0b110)
    res = prune_features([f1, f2], 0b111)
    assert res.surviving == {0, 1}


def test_partnerless_feature_pruned():
    f1 = LECFeature(0, (E1,), 0b001)
    f2 = LECFeature(1, (E1,), 0b110)
    loner = LECFeature(2, ("0##z|p|w",), 0b010)  # nobody shares its edge
    res = prune_features([f1, f2, loner], 0b111)
    assert res.surviving == {0, 1}


def test_sign_overlap_blocks_merge():
    f1 = LECFeature(0, (E1,), 0b011)
    f2 = LECFeature(1, (E1,), 0b110)  # overlaps bit 1
    res = prune_features([f1, f2], 0b111)
    assert res.surviving == set()


def test_conflicting_query_edge_blocks_merge():
    f1 = LECFeature(0, (E1,), 0b001)
    f2 = LECFeature(1, ("0##x|p|y",), 0b110)  # same qe 0, different edge
    res = prune_features([f1, f2], 0b111)
    assert res.surviving == set()


def test_three_way_chain():
    # f1 shares E1 with f2; f2 shares E2 with f3; signs OR to 0b111
    f1 = LECFeature(0, (E1,), 0b001)
    f2 = LECFeature(1, (E1, E2), 0b010)
    f3 = LECFeature(2, (E2,), 0b100)
    res = prune_features([f1, f2, f3], 0b111)
    assert res.surviving == {0, 1, 2}


def test_incomplete_union_prunes_all():
    # signs only OR to 0b011 < full 0b111
    f1 = LECFeature(0, (E1,), 0b001)
    f2 = LECFeature(1, (E1,), 0b010)
    res = prune_features([f1, f2], 0b111)
    assert res.surviving == set()


def test_empty_features():
    res = prune_features([], 0b1)
    assert res.surviving == set() and res.complete


def test_surviving_feature_keys():
    f1 = LECFeature(0, (E1,), 0b001)
    f2 = LECFeature(1, (E1,), 0b110)
    res = prune_features([f1, f2], 0b111)
    assert surviving_feature_keys([f1, f2], res) == {
        (0, 0b001, (E1,)),
        (1, 0b110, (E1,)),
    }


def test_same_fragment_features_can_combine_via_bridge():
    """The paper-example pattern {PM_1^1, PM_2^3, PM_1^3}: two features of
    the same fragment merge through a bridging feature of another one."""
    a = LECFeature(0, (E1,), 0b001)  # F1
    bridge = LECFeature(1, (E1, E2), 0b010)  # F2, shares an edge with both
    b = LECFeature(0, (E2,), 0b100)  # F1 again
    res = prune_features([a, bridge, b], 0b111)
    assert res.surviving == {0, 1, 2}


def test_joinable_requires_shared_edge_and_fragments():
    a = LECFeature(0, (E1,), 0b001)
    b = LECFeature(1, (E2,), 0b110)
    assert not joinable(a, b)  # no shared edge
    c = LECFeature(0, (E1,), 0b110)
    assert not joinable(a, c)  # same fragment
    d = LECFeature(1, (E1,), 0b110)
    assert joinable(a, d)
    assert joinable(d, a)  # symmetric


def test_feature_groups_by_sign():
    a = LECFeature(0, (E1,), 0b001)
    b = LECFeature(1, (E2,), 0b001)
    c = LECFeature(2, (E1,), 0b010)
    groups = feature_groups([a, b, c])
    assert set(groups) == {0b001, 0b010}
    assert len(groups[0b001]) == 2


def test_ser_bytes_positive_and_monotone():
    small = LECFeature(0, (E1,), 0b1)
    big = LECFeature(0, (E1, E2, "2##long|predicate|target"), 0b1)
    assert 0 < small.ser_bytes() < big.ser_bytes()
