"""Tests for the table harness (rendering, persistence, scales)."""
import json

from repro.core.engine import StageMetrics
from repro.rdf.queries import ALL_QUERIES
from repro.tables import (
    BENCH_K,
    BENCH_SCALE,
    GENERATORS,
    format_stage_table,
    save_json,
    save_metrics,
)


def _m(q="LQ1"):
    return StageMetrics(
        query=q, selective=True, star=False, cand_time_ms=12,
        cand_ship_kb=3.5, pm_time_ms=100, lec_time_ms=5, lec_ship_kb=1.25,
        assembly_time_ms=40, total_ms=160, n_pms=42, n_matches=7,
        n_crossing=6,
    )


def test_format_stage_table_contains_all_columns():
    out = format_stage_table([_m()], "Table X")
    assert "Table X" in out
    header, row = out.splitlines()[2], out.splitlines()[3]
    assert "cand_ms" in header and "crossing" in header
    assert "LQ1" in row and "42" in row and "160" in row


def test_metrics_row_values():
    row = _m().row()
    assert row["sel"] == "Y"
    assert row["cand_kb"] == 3.5
    assert row["lec_kb"] == 1.2  # rounded
    assert row["pms"] == 42


def test_save_metrics_roundtrip(tmp_path):
    p = tmp_path / "t.json"
    save_metrics([_m("LQ2"), _m("LQ3")], p)
    data = json.loads(p.read_text())
    assert [r["query"] for r in data["rows"]] == ["LQ2", "LQ3"]
    assert data["rows"][0]["n_pms"] == 42


def test_save_json(tmp_path):
    p = tmp_path / "x" / "y.json"
    save_json({"a": 1}, p)
    assert json.loads(p.read_text()) == {"a": 1}


def test_bench_scales_defined_for_all_datasets():
    assert set(BENCH_SCALE) == set(GENERATORS) == set(ALL_QUERIES)
    assert BENCH_K >= 2


def test_bench_scale_generators_run():
    # smoke-test the generators at a fraction of bench scale
    for ds, gen in GENERATORS.items():
        kwargs = dict(BENCH_SCALE[ds])
        for key in kwargs:
            if key != "seed":
                kwargs[key] = max(2, kwargs[key] // 10)
        pdf = gen(**kwargs)
        assert len(pdf) > 100
