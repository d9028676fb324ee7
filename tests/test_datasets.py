"""Generator tests: determinism, schema conventions, and the planted
cardinalities each table row relies on — all checked against DuckDB."""
import pandas as pd
import pytest

from repro.rdf.datasets import btc, lubm, paper_example, yago2
from repro.rdf.queries import ALL_QUERIES, BTC_QUERIES, LUBM_QUERIES, YAGO_QUERIES
from tests.helpers import oracle_rows


@pytest.fixture(scope="module")
def lubm_pdf():
    return lubm(universities=2, seed=7)


@pytest.fixture(scope="module")
def yago_pdf():
    return yago2(persons=80, seed=11)


@pytest.fixture(scope="module")
def btc_pdf():
    return btc(persons_per_pub=40, seed=13)


@pytest.mark.parametrize(
    "gen,kwargs",
    [
        (lubm, {"universities": 2}),
        (yago2, {"persons": 80}),
        (btc, {"persons_per_pub": 40}),
    ],
)
def test_generators_deterministic(gen, kwargs):
    pd.testing.assert_frame_equal(gen(**kwargs), gen(**kwargs))


def test_generators_scale(lubm_pdf):
    assert len(lubm(universities=4)) > len(lubm_pdf) * 1.5


def test_triples_schema(lubm_pdf, yago_pdf, btc_pdf):
    for pdf in (lubm_pdf, yago_pdf, btc_pdf):
        assert list(pdf.columns) == ["s", "p", "o"]
        assert not pdf.duplicated().any()
        assert pdf.notna().all().all()


def test_lubm_uri_domains_embed_university(lubm_pdf):
    subj = lubm_pdf["s"]
    ents = subj[subj.str.startswith("lubm:U")]
    assert ents.str.match(r"lubm:U\d+").all()


def test_query_constants_exist_at_minimal_scale(lubm_pdf, yago_pdf, btc_pdf):
    data = {"lubm": lubm_pdf, "yago2": yago_pdf, "btc": btc_pdf}
    for ds, queries in ALL_QUERIES.items():
        verts = set(data[ds]["s"]) | set(data[ds]["o"])
        for q in queries.values():
            for v in q.vertices:
                if not v.startswith("?") and q.name != "BQ3":
                    assert v in verts, f"{q.name}: missing constant {v}"


# ---- planted cardinalities (shape classes of Tables I-III) ---------------

def n(pdf, query):
    return len(oracle_rows(pdf, query))


def test_lubm_cardinality_shapes(lubm_pdf):
    counts = {name: n(lubm_pdf, q) for name, q in LUBM_QUERIES.items()}
    assert counts["LQ3"] == 0  # ontology-mismatch zero
    assert counts["LQ4"] == 6  # professors of U0:D0
    assert counts["LQ5"] == 8  # grads of U0:D0
    assert counts["LQ1"] >= 0 and counts["LQ6"] > 0
    # unselective queries dominate
    assert counts["LQ2"] > 10 * max(counts["LQ4"], counts["LQ5"])
    assert counts["LQ7"] > 10 * max(counts["LQ4"], counts["LQ5"])


def test_yago_cardinality_shapes(yago_pdf):
    counts = {name: n(yago_pdf, q) for name, q in YAGO_QUERIES.items()}
    assert counts["YQ1"] == 17  # planted couples
    assert counts["YQ2"] == 0
    assert counts["YQ4"] > 0
    assert counts["YQ3"] > 5 * counts["YQ1"]  # the heavy row


def test_yago_yq2_has_nonempty_candidates(yago_pdf):
    # actor-directors exist (so candidate sets are non-trivial) ...
    both = set(yago_pdf[yago_pdf.p == "y:actedIn"].s) & set(
        yago_pdf[yago_pdf.p == "y:directed"].s
    )
    assert both
    # ... but none of them is born in city1
    born1 = set(
        yago_pdf[(yago_pdf.p == "y:wasBornIn") & (yago_pdf.o == "yago:city1")].s
    )
    assert not (both & born1)


def test_btc_cardinality_shapes(btc_pdf):
    counts = {name: n(btc_pdf, q) for name, q in BTC_QUERIES.items()}
    assert counts == {
        "BQ1": 1,
        "BQ2": 2,
        "BQ3": 0,
        "BQ4": 4,
        "BQ5": 12,
        "BQ6": 0,
        "BQ7": 0,
    }


def test_btc_knows_graph_is_triangle_free(btc_pdf):
    """Random knows edges are strictly layered; planted edges may point
    "backwards" but only into reserved sinks with no outgoing knows —
    either way no directed triangle can form (BQ7 = 0 by construction)."""
    knows = btc_pdf[btc_pdf.p == "foaf:knows"]
    subjects = set(knows.s)

    def layer(v):
        tail = v.rsplit(":", 1)[1]
        return int(tail) % 3 if tail.isdigit() else None

    for s, o in zip(knows.s, knows.o):
        ls, lo = layer(s), layer(o)
        if ls is not None and lo is not None and lo != ls + 1:
            assert o not in subjects, f"backward edge {s}->{o} into a source"


def test_btc_bq7_candidates_nonempty(btc_pdf):
    knows = btc_pdf[btc_pdf.p == "foaf:knows"]
    assert set(knows.s) & set(knows.o)  # middle layer has in+out knows


def test_paper_example_shapes():
    triples, vfrag, query = paper_example()
    assert len(triples) == 13
    assert query.n_vertices == 5
    assert set(vfrag.frag) == {0, 1, 2}
    assert set(triples.s) | set(triples.o) <= set(vfrag.v)
