"""Benchmark harness: workload builder, sweep runner, memory measurement,
table formatting."""
import json
import math

from repro.bench.harness import (
    build_workload,
    cell,
    fmt_table,
    measure_memory,
    run_algorithms,
    save_results,
)


class TestBuildWorkload:
    def test_deterministic(self):
        a = build_workload("snb", n_updates=100, n_queries=10, seed=0)
        b = build_workload("snb", n_updates=100, n_queries=10, seed=0)
        assert a[0] == b[0]
        assert [(q.vertices, q.edges) for q in a[1]] == [
            (q.vertices, q.edges) for q in b[1]
        ]

    def test_sizes(self):
        updates, queries = build_workload("biogrid", n_updates=123, n_queries=7, seed=1)
        assert len(updates) == 123 and len(queries) == 7


class TestRunAlgorithms:
    def test_metrics_fields(self):
        updates, queries = build_workload("snb", n_updates=80, n_queries=8, seed=0)
        res = run_algorithms(updates, queries, ["tric", "graphdb"])
        assert set(res) == {"tric", "graphdb"}
        m = res["tric"]
        assert m["processed"] == 80 and not m["timed_out"]
        assert m["index_s"] >= 0 and not math.isnan(m["avg_ms_per_update"])
        assert res["tric"]["n_matched"] == res["graphdb"]["n_matched"]

    def test_time_limit_marks_timeout(self):
        updates, queries = build_workload("snb", n_updates=400, n_queries=40, seed=0)
        res = run_algorithms(updates, queries, ["inv"], time_limit_s=1e-4)
        assert res["inv"]["timed_out"]


class TestMemory:
    def test_positive_and_same_magnitude(self):
        updates, queries = build_workload("snb", n_updates=150, n_queries=15, seed=0)
        plain = measure_memory("tric", updates, queries)
        cached = measure_memory("tric+", updates, queries)
        assert plain > 0 and cached > 0
        # the cached/uncached Table-1 ordering only emerges at bench scale;
        # at test scale just require the same order of magnitude
        assert 0.2 < cached / plain < 5

    def test_time_limit_respected(self):
        updates, queries = build_workload("snb", n_updates=600, n_queries=60, seed=0)
        assert measure_memory("inv", updates, queries, time_limit_s=0.2) > 0


class TestFormatting:
    def test_cell_plain_and_timeout(self):
        assert cell({"avg_ms_per_update": 1.23456, "timed_out": False}) == "1.235"
        s = cell({"avg_ms_per_update": 9.9, "timed_out": True, "processed": 42})
        assert s.startswith("9.900*") and "|G_E|=42" in s

    def test_fmt_table_contains_all_cells(self):
        rows = [{"x": "a", "tric": "1.0"}, {"x": "b", "tric": "2.0"}]
        out = fmt_table("T", rows, ["x", "tric"])
        assert "T" in out and "1.0" in out and "2.0" in out

    def test_save_results_roundtrip(self, tmp_path):
        p = tmp_path / "sub" / "r.json"
        save_results({"a": 1}, str(p))
        assert json.loads(p.read_text()) == {"a": 1}
