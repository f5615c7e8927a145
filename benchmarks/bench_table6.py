"""Table 6 cells: constrained mining — anti-vertex p7 (maximal
triangles), anti-edge p8 (vertex-induced chordal square), and the
14-clique existence query, on all four graphs."""
import pytest

from repro.core.matcher import count_matches
from repro.core.mining import exists_clique
from repro.patterns_eval import P7, P8

from .conftest import run_once

GRAPHS = ["mi", "pa", "ok", "fr"]


@pytest.mark.parametrize("gname", GRAPHS)
def test_exists_14clique(benchmark, gname, request):
    sg = request.getfixturevalue(gname)
    found = run_once(benchmark, lambda: exists_clique(sg.edges, 14))
    print(f"\n[table6] 14-clique on {sg.graph.name}: found={found}")


@pytest.mark.parametrize("gname", GRAPHS)
def test_anti_vertex_p7(benchmark, gname, request):
    sg = request.getfixturevalue(gname)
    n = run_once(benchmark, lambda: count_matches(sg.edges, P7))
    print(f"\n[table6] p7 (maximal triangles) on {sg.graph.name}: {n}")


@pytest.mark.parametrize("gname", GRAPHS)
def test_anti_edge_p8(benchmark, gname, request):
    sg = request.getfixturevalue(gname)
    n = run_once(benchmark, lambda: count_matches(sg.edges, P8))
    print(f"\n[table6] p8 (vertex-induced chordal square) on {sg.graph.name}: {n}")
