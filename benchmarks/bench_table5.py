"""Table 5 cells: PRG vs purpose-built G-Miner ('GM') — 3-clique
counting on all graphs and labeled-p2 matching on the labeled graphs."""
import pytest

from repro.baseline.purpose import (
    gminer_match_labeled_triangle,
    gminer_triangle_count,
)
from repro.core.matcher import count_matches
from repro.core.mining import count_cliques
from repro.patterns_eval import P2

from .conftest import run_once


@pytest.mark.parametrize("gname", ["mi", "pa", "ok", "fr"])
def test_3cliques_prg(benchmark, gname, request):
    sg = request.getfixturevalue(gname)
    run_once(benchmark, lambda: count_cliques(sg.edges, 3))


@pytest.mark.parametrize("gname", ["mi", "pa", "ok", "fr"])
def test_3cliques_gm(benchmark, gname, request):
    sg = request.getfixturevalue(gname)
    run_once(benchmark, lambda: gminer_triangle_count(sg.edges))


@pytest.mark.parametrize("gname", ["mi", "pa_labeled"])
def test_match_p2_prg(benchmark, gname, request):
    sg = request.getfixturevalue(gname)
    run_once(benchmark, lambda: count_matches(sg.edges, P2, labels=sg.labels))


@pytest.mark.parametrize("gname", ["mi", "pa_labeled"])
def test_match_p2_gm(benchmark, gname, request):
    sg = request.getfixturevalue(gname)
    run_once(benchmark, lambda: gminer_match_labeled_triangle(
        sg.edges, sg.labels, P2))
