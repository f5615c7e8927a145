"""Tests for the harness and table runners (cheap paths only — the full
table sweeps are exercised by the benchmarks)."""
import time

import pytest

from repro.baseline.common import BudgetExceeded
from repro.experiments import run_table2, summarize_table1
from repro.harness import (
    Cell,
    SparkGraph,
    deserialize_rows,
    markdown_table,
    run_cell,
    serialize_rows,
    speedup,
)
from repro.patterns_eval import EVAL_PATTERNS, P7, P8


class TestRunCell:
    def test_times_and_returns(self):
        c = run_cell(lambda: 42)
        assert c.value == 42 and c.seconds is not None and c.seconds >= 0

    def test_budget_becomes_dash(self):
        def boom():
            raise BudgetExceeded("too much")

        c = run_cell(boom)
        assert c.seconds is None
        assert c.fmt_time() == "—" and c.fmt_value() == "—"

    def test_other_exceptions_propagate(self):
        with pytest.raises(RuntimeError):
            run_cell(lambda: (_ for _ in ()).throw(RuntimeError("x")))


class TestFormatting:
    def test_markdown_table(self):
        md = markdown_table(["a", "b"], [["1", "2"], ["3", "4"]])
        lines = md.splitlines()
        assert lines[0] == "| a | b |"
        assert lines[1] == "|---|---|"
        assert len(lines) == 4

    def test_speedup(self):
        assert speedup(Cell(seconds=2.0), Cell(seconds=10.0)) == "5.0x"
        assert speedup(Cell(seconds=2.0), Cell(seconds=None)) == "—"
        assert speedup(Cell(seconds=None), Cell(seconds=1.0)) == "—"


class TestSerialization:
    def test_roundtrip_preserves_seconds(self):
        rows = [dict(app="x", g="MI", prg=Cell(1.5, 42), abq=Cell(seconds=None))]
        back = deserialize_rows(serialize_rows(rows))
        assert back[0]["prg"].seconds == 1.5
        assert back[0]["abq"].seconds is None
        assert back[0]["app"] == "x"

    def test_serialized_is_json_safe(self):
        import json

        rows = [dict(prg=Cell(0.1, {"weird": object()}))]
        json.dumps(serialize_rows(rows))  # must not raise

    def test_summary_works_on_deserialized(self):
        rows = [dict(app="x", g="MI", prg=Cell(1.0, 1), fcl=Cell(5.0, 1))]
        back = deserialize_rows(serialize_rows(rows))
        md, s = summarize_table1([], back, [], [])
        by = {r["system"]: r for r in s}
        assert by["Fractal (FCL)"]["max"] == "5.0x"


class TestSparkGraph:
    def test_load_unload(self, sparks):
        from repro.graph.gengraph import powerlaw_graph

        sg = SparkGraph.load(sparks, powerlaw_graph(50, 120, seed=1))
        assert sg.edges.is_cached
        assert sg.labels is None
        sg.unload()


class TestTable2:
    def test_runs_and_renders(self):
        md, rows = run_table2()
        assert "| MI |" in md and "| FR |" in md
        assert len(rows) == 5


class TestEvalPatterns:
    def test_all_eight_defined(self):
        assert set(EVAL_PATTERNS) == {f"p{i}" for i in range(1, 9)}

    def test_p7_is_constrained_triangle(self):
        assert P7.anti_vertices and len(P7.edges) == 3

    def test_p8_has_anti_edge(self):
        assert P8.anti_edges and not P8.anti_vertices

    def test_p2_fully_labeled(self):
        assert all(l is not None for l in EVAL_PATTERNS["p2"].labels)


class TestTable1Summary:
    def test_summary_from_synthetic_rows(self):
        t3 = [
            dict(app="x", g="MI", prg=Cell(1.0, 1), abq=Cell(10.0, 1), rs=Cell(seconds=None)),
            dict(app="y", g="PA", prg=Cell(2.0, 1), abq=Cell(4.0, 1), rs=Cell(40.0, 1)),
        ]
        t4 = [dict(app="x", g="MI", prg=Cell(1.0, 1), fcl=Cell(3.0, 1))]
        t5 = [dict(app="x", g="MI", prg=Cell(1.0, 1), gm=Cell(seconds=None))]
        f10 = [dict(app="x", g="MI", prg=Cell(1.0, 1), prgu=Cell(8.0, 1))]
        md, rows = summarize_table1(t3, t4, t5, f10)
        by = {r["system"]: r for r in rows}
        assert by["Arabesque (ABQ)"]["min"] == "2.0x"
        assert by["Arabesque (ABQ)"]["max"] == "10.0x"
        assert by["RStream (RS)"]["failed"] == 1
        assert by["G-Miner (GM)"]["failed"] == 1
        assert by["PRG-U (no sym. breaking)"]["max"] == "8.0x"
