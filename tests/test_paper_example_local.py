"""The paper's running example (Figs 1–3, Examples 4–8), driver-side.

Asserts the exact local partial matches of Fig 3, the LEC features of
Example 6, the sign groups, Algorithm 2's pruning of PM_3^2's feature, and
the post-prune groups of Example 8. Fragment ``i`` is the paper's
``F_{i+1}``; vertex order is (v1=?p2, v2=?t, v3=?p1, v4=?l, v5="003").
"""
import pytest

from repro.core.lec import (
    LECFeature,
    feature_groups,
    group_join_graph,
    joinable,
)
from repro.core.partial_eval import enumerate_local_pms
from repro.core.pruning import prune_features
from repro.rdf.datasets import paper_example
from repro.rdf.graph import fragment_edges_pdf


@pytest.fixture(scope="module")
def example():
    triples, vfrag, query = paper_example()
    fe = fragment_edges_pdf(triples, vfrag)
    pms = {}
    for frag in (0, 1, 2):
        rows = [
            tuple(r)
            for r in fe[fe["frag"] == frag][
                ["s", "p", "o", "s_frag", "o_frag"]
            ].itertuples(index=False)
        ]
        pms[frag] = enumerate_local_pms(rows, frag, query)
    return triples, vfrag, query, pms


def ser(pm, n=5):
    return tuple(pm[f"m_{i}"] for i in range(n))


def sign_bits(pm, query):
    return query.sign_str(pm["sign"])


# ---- Fig 3: the exact eight local partial matches -------------------------

def test_fragment1_pms(example):
    *_, query, pms = example
    got = {ser(pm) for pm in pms[0]}
    assert got == {
        ("006", None, "001", None, "003"),  # PM_1^1
        ("012", None, "001", None, "003"),  # PM_1^2
        ("006", "005", None, "004", None),  # PM_1^3
    }


def test_fragment2_pms(example):
    *_, query, pms = example
    got = {ser(pm) for pm in pms[1]}
    assert got == {
        ("006", "008", "001", "009", None),  # PM_2^1
        ("006", "010", "001", "011", None),  # PM_2^2
        ("006", "005", "001", None, None),  # PM_2^3
    }


def test_fragment3_pms(example):
    *_, query, pms = example
    got = {ser(pm) for pm in pms[2]}
    assert got == {
        ("012", "015", "001", "016", None),  # PM_3^1
        ("014", "013", None, "017", None),  # PM_3^2
    }


def test_pm_signs_match_paper(example):
    *_, query, pms = example
    by_ser = {
        ser(pm): sign_bits(pm, query) for f in pms for pm in pms[f]
    }
    assert by_ser[("006", None, "001", None, "003")] == "[00101]"  # PM_1^1
    assert by_ser[("006", "005", None, "004", None)] == "[01010]"  # PM_1^3
    assert by_ser[("006", "008", "001", "009", None)] == "[11010]"  # PM_2^1
    assert by_ser[("006", "005", "001", None, None)] == "[10000]"  # PM_2^3
    assert by_ser[("012", "015", "001", "016", None)] == "[11010]"  # PM_3^1
    assert by_ser[("014", "013", None, "017", None)] == "[01010]"  # PM_3^2


# ---- Example 6: the seven LEC features ------------------------------------

def features_of(pms):
    feats = set()
    for frag, lst in pms.items():
        for pm in lst:
            feats.add(LECFeature(frag, tuple(pm["cmap"]), pm["sign"]))
    return feats


def test_lec_features_match_example6(example):
    *_, query, pms = example
    # qe indices: 0 = v2v4 (label), 1 = v3v1 (influencedBy),
    #             2 = v1v2 (mainInterest), 3 = v3v5 (name)
    def sign(bits: str) -> int:
        return int(bits[::-1], 2)

    expected = {
        LECFeature(0, ("1##001|influencedBy|006",), sign("00101")),
        LECFeature(0, ("1##001|influencedBy|012",), sign("00101")),
        LECFeature(0, ("2##006|mainInterest|005",), sign("01010")),
        LECFeature(1, ("1##001|influencedBy|006",), sign("11010")),
        LECFeature(
            1,
            ("1##001|influencedBy|006", "2##006|mainInterest|005"),
            sign("10000"),
        ),
        LECFeature(2, ("1##001|influencedBy|012",), sign("11010")),
        LECFeature(2, ("2##014|mainInterest|013",), sign("01010")),
    }
    assert features_of(pms) == expected


def test_pm21_pm22_share_a_feature(example):
    *_, pms = example[0], example[3]
    feats = [LECFeature(1, tuple(pm["cmap"]), pm["sign"]) for pm in pms[1]]
    # 3 PMs in F2 but only 2 distinct features (PM_2^1 ~ PM_2^2)
    assert len(feats) == 3 and len(set(feats)) == 2


# ---- Definition 9 joinability on the example ------------------------------

def by_ser_feature(pms):
    return {
        ser(pm): LECFeature(f, tuple(pm["cmap"]), pm["sign"])
        for f in pms
        for pm in pms[f]
    }


def test_joinability_examples(example):
    *_, pms = example[0], example[3]
    f = by_ser_feature(pms)
    pm11 = f[("006", None, "001", None, "003")]
    pm12 = f[("012", None, "001", None, "003")]
    pm21 = f[("006", "008", "001", "009", None)]
    pm23 = f[("006", "005", "001", None, None)]
    pm13 = f[("006", "005", None, "004", None)]
    pm31 = f[("012", "015", "001", "016", None)]
    pm32 = f[("014", "013", None, "017", None)]
    assert joinable(pm11, pm21)  # Theorem 2's example
    assert joinable(pm11, pm23)
    assert joinable(pm13, pm23)
    assert joinable(pm12, pm31)
    assert not joinable(pm11, pm12)  # same fragment (cond 1)
    assert not joinable(pm12, pm23)  # conflicting v3v1 mapping (cond 3)
    assert not joinable(pm11, pm31)  # no shared crossing edge (cond 2)
    assert not joinable(pm32, pm13)  # same LECSign (Theorem 5) + no share
    assert not all(
        joinable(pm32, other)
        for other in (pm11, pm12, pm21, pm23, pm13, pm31)
    )


def test_theorem5_same_sign_never_joinable(example):
    *_, pms = example[0], example[3]
    feats = list(features_of(pms))
    for a in feats:
        for b in feats:
            if a.sign == b.sign:
                assert not joinable(a, b)


# ---- Example 7 / Definition 10: sign groups -------------------------------

def test_sign_groups(example):
    *_, query, pms = example
    groups = feature_groups(list(features_of(pms)))
    sizes = {query.sign_str(s): len(fs) for s, fs in groups.items()}
    # Def 10 groups strictly by LECSign: LF(PM_1^3) and LF(PM_3^2) share
    # [01010], so we get 4 groups where Example 7's (implementation-refined)
    # listing shows 5; the pruning outcome is identical.
    assert sizes == {
        "[00101]": 2,  # P1 = {LF(PM_1^1), LF(PM_1^2)}
        "[01010]": 2,  # P2 ∪ P5
        "[11010]": 2,  # P3 = {LF(PM_2^1), LF(PM_3^1)}
        "[10000]": 1,  # P4 = {LF(PM_2^3)}
    }


def test_group_join_graph_edges(example):
    *_, query, pms = example
    groups = feature_groups(list(features_of(pms)))
    edges = group_join_graph(groups)

    def sign(bits: str) -> int:
        return int(bits[::-1], 2)

    norm = {tuple(sorted(e)) for e in edges}
    assert norm == {
        tuple(sorted((sign("00101"), sign("11010")))),
        tuple(sorted((sign("00101"), sign("10000")))),
        tuple(sorted((sign("01010"), sign("10000")))),
    }


# ---- Algorithm 2: PM_3^2's feature is pruned ------------------------------

def test_pruning_drops_pm32_feature_only(example):
    *_, query, pms = example
    feats = sorted(
        features_of(pms), key=lambda f: (f.frag, f.cmap, f.sign)
    )
    res = prune_features(feats, query.full_sign)
    assert res.complete
    kept = {feats[i] for i in res.surviving}
    dropped = set(feats) - kept
    assert dropped == {
        LECFeature(2, ("2##014|mainInterest|013",), int("01010"[::-1], 2))
    }


def test_post_prune_groups_match_example8(example):
    *_, query, pms = example
    feats = sorted(
        features_of(pms), key=lambda f: (f.frag, f.cmap, f.sign)
    )
    res = prune_features(feats, query.full_sign)
    kept = [feats[i] for i in res.surviving]
    groups = feature_groups(kept)
    # Example 8: Gr1 (sign 00101), Gr2 (01010), Gr3 (11010), Gr4 (10000)
    assert {query.sign_str(s) for s in groups} == {
        "[00101]",
        "[01010]",
        "[11010]",
        "[10000]",
    }
