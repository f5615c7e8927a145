"""Figure 1b/1c: profiling counts (matches explored, canonicality and
isomorphism computations) for pattern-aware vs pattern-oblivious
engines, on the Patents stand-in. The bench output's timing column is
secondary here; the point is the printed count table (also produced by
``jobs/fig1_profile.py`` and recorded in EXPERIMENTS.md)."""
from repro.baseline.bfs import bfs_count_cliques, bfs_count_motifs
from repro.baseline.dfs import dfs_count_cliques, dfs_count_motifs
from repro.core.matcher import count_matches
from repro.core.mining import count_motifs
from repro.core.pattern import clique

from .conftest import run_once


def test_fig1b_prg_4clique(benchmark, pa):
    n = run_once(benchmark, lambda: count_matches(pa.edges, clique(4)))
    print(f"\n[fig1b] PRG 4-clique: explored={n} canon=0 iso=0 result={n}")


def test_fig1b_abq_4clique(benchmark, pa):
    m = run_once(
        benchmark,
        lambda: bfs_count_cliques(pa.edges, pa.graph.edges_pdf, 4, mode="abq", budget=None),
    )
    print(f"\n[fig1b] ABQ 4-clique: explored={m.explored} "
          f"canon={m.canonicality} iso={m.isomorphism} result={m.result}")


def test_fig1b_rs_4clique(benchmark, pa):
    m = run_once(
        benchmark,
        lambda: bfs_count_cliques(pa.edges, pa.graph.edges_pdf, 4, mode="rs", budget=None),
    )
    print(f"\n[fig1b] RS 4-clique: explored={m.explored} "
          f"canon={m.canonicality} iso={m.isomorphism} result={m.result}")


def test_fig1b_fcl_4clique(benchmark, pa):
    m = run_once(
        benchmark,
        lambda: dfs_count_cliques(pa.edges, pa.graph.edges_pdf, 4, budget=None),
    )
    print(f"\n[fig1b] FCL 4-clique: explored={m.explored} "
          f"canon={m.canonicality} iso={m.isomorphism} result={m.result}")


def test_fig1c_prg_3motif(benchmark, pa):
    r = run_once(benchmark, lambda: count_motifs(pa.edges, 3))
    total = sum(r.values())
    print(f"\n[fig1c] PRG 3-motif: explored={total} canon=0 iso=0 result={total}")


def test_fig1c_abq_3motif(benchmark, pa):
    m = run_once(
        benchmark,
        lambda: bfs_count_motifs(pa.edges, pa.graph.edges_pdf, 3, mode="abq", budget=None),
    )
    print(f"\n[fig1c] ABQ 3-motif: explored={m.explored} "
          f"canon={m.canonicality} iso={m.isomorphism} result={sum(m.result.values())}")


def test_fig1c_rs_3motif(benchmark, pa):
    m = run_once(
        benchmark,
        lambda: bfs_count_motifs(pa.edges, pa.graph.edges_pdf, 3, mode="rs", budget=None),
    )
    print(f"\n[fig1c] RS 3-motif: explored={m.explored} "
          f"canon={m.canonicality} iso={m.isomorphism} result={sum(m.result.values())}")


def test_fig1c_fcl_3motif(benchmark, pa):
    m = run_once(
        benchmark,
        lambda: dfs_count_motifs(pa.edges, pa.graph.edges_pdf, 3, budget=None),
    )
    print(f"\n[fig1c] FCL 3-motif: explored={m.explored} "
          f"canon={m.canonicality} iso={m.isomorphism} result={sum(m.result.values())}")
