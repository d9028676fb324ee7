"""Unit tests for the BGP query model (Definition 2)."""
import pytest

from repro.core.query import Query, TriplePattern, is_var, var_col


def test_is_var():
    assert is_var("?x")
    assert not is_var("lubm:U0")
    assert not is_var("literal value")


def test_var_col_sanitizes():
    assert var_col("?p1") == "p1"
    assert var_col("?a-b.c") == "a_b_c"


def test_vertices_in_first_appearance_order():
    q = Query([("?a", "p", "?b"), ("?b", "q", "?c")])
    assert q.vertices == ["?a", "?b", "?c"]
    assert q.vertex_index == {"?a": 0, "?b": 1, "?c": 2}


def test_explicit_vertex_order():
    q = Query([("?a", "p", "?b")], vertex_order=["?b", "?a"])
    assert q.vertices == ["?b", "?a"]


def test_vertex_order_must_be_permutation():
    with pytest.raises(ValueError):
        Query([("?a", "p", "?b")], vertex_order=["?b", "?c"])


def test_constants_are_vertices():
    q = Query([("?a", "p", "c1"), ("?a", "q", "c2")])
    assert "c1" in q.vertices and "c2" in q.vertices
    assert q.vertex_vars == ["?a"]


def test_pred_vars_collected():
    q = Query([("?a", "?p", "?b"), ("?b", "q", "?a")])
    assert q.pred_vars == ["?p"]
    assert q.variables == ["?a", "?b", "?p"]


def test_term_cannot_be_both_vertex_and_predicate():
    with pytest.raises(ValueError):
        Query([("?a", "p", "?b"), ("?a", "?b", "?c")])


def test_disconnected_query_rejected():
    with pytest.raises(ValueError):
        Query([("?a", "p", "?b"), ("?c", "p", "?d")])


def test_edges_carry_pattern_index():
    q = Query([("?a", "p", "?b"), ("?b", "q", "?c")])
    assert [(e.idx, e.si, e.oi, e.p) for e in q.edges] == [
        (0, 0, 1, "p"),
        (1, 1, 2, "q"),
    ]


def test_incident_edges():
    q = Query([("?a", "p", "?b"), ("?b", "q", "?c")])
    assert [e.idx for e in q.incident_edges(1)] == [0, 1]
    assert [e.idx for e in q.incident_edges(0)] == [0]


@pytest.mark.parametrize(
    "patterns,star",
    [
        ([("?x", "p", "?a")], True),
        ([("?x", "p", "?a"), ("?x", "q", "?b")], True),
        # in+out around ?x is NOT a paper-style (subject-shared) star
        ([("?x", "p", "?a"), ("?b", "q", "?x")], False),
        ([("?x", "p", "?a"), ("?a", "q", "?b")], False),  # path
        (
            [("?x", "p", "?a"), ("?a", "q", "?b"), ("?b", "r", "?x")],
            False,
        ),  # triangle
        # parallel edges to the same object form a cycle (paper's YQ2)
        ([("?a", "p", "?m"), ("?a", "q", "?m")], False),
        ([("?x", "p", "?x")], False),  # self-loop is not a star
    ],
)
def test_is_star(patterns, star):
    assert Query(patterns).is_star() is star


def test_full_sign_and_sign_str():
    q = Query([("?a", "p", "?b"), ("?b", "q", "?c")])
    assert q.full_sign == 0b111
    assert q.sign_str(0b101) == "[101]"
    assert q.sign_str(0) == "[000]"


def test_default_selectivity_flag():
    assert Query([("?a", "p", "c")]).selective
    assert not Query([("?a", "p", "?b")]).selective
    # explicit flag wins
    assert not Query([("?a", "p", "c")], selective=False).selective


def test_binding_columns():
    q = Query([("?a", "?p", "c")])
    assert q.binding_columns() == ["a", "p"]


def test_repeated_pattern_allowed_multigraph():
    q = Query([("?a", "p", "?b"), ("?a", "p2", "?b")])
    assert len(q.edges) == 2
    assert q.n_vertices == 2


def test_triple_pattern_terms():
    assert TriplePattern("?a", "p", "?b").terms() == ("?a", "p", "?b")
