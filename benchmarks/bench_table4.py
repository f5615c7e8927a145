"""Table 4 cells: PRG vs depth-first (Fractal 'FCL') on motifs,
cliques, FSM and pattern matching p1..p6. Representative subset; full
table from jobs/table4_dfs.py."""
import pytest

from repro.baseline.dfs import (
    dfs_count_cliques,
    dfs_count_motifs,
    dfs_fsm,
    dfs_match_pattern,
)
from repro.core.matcher import count_matches
from repro.core.mining import count_cliques, count_motifs, fsm
from repro.harness import BASELINE_BUDGET
from repro.patterns_eval import EVAL_PATTERNS

from .conftest import run_once


def test_3motifs_pa_fcl(benchmark, pa):
    run_once(benchmark, lambda: dfs_count_motifs(
        pa.edges, pa.graph.edges_pdf, 3, budget=BASELINE_BUDGET))


def test_4motifs_mi_fcl(benchmark, mi):
    run_once(benchmark, lambda: dfs_count_motifs(
        mi.edges, mi.graph.edges_pdf, 4, budget=BASELINE_BUDGET))


def test_4motifs_mi_prg(benchmark, mi):
    run_once(benchmark, lambda: count_motifs(mi.edges, 4))


@pytest.mark.parametrize("k", [3, 4, 5])
def test_cliques_pa_fcl(benchmark, pa, k):
    run_once(benchmark, lambda: dfs_count_cliques(
        pa.edges, pa.graph.edges_pdf, k, budget=BASELINE_BUDGET))


@pytest.mark.parametrize("k", [3, 4, 5])
def test_cliques_pa_prg(benchmark, pa, k):
    run_once(benchmark, lambda: count_cliques(pa.edges, k))


def test_fsm_mi_fcl(benchmark, mi):
    """DFS FSM with a per-task budget (worker-memory analog); the cell
    typically exhausts it — the paper's Fractal FSM failure mode."""
    from repro.baseline.common import BudgetExceeded

    def cell():
        try:
            return dfs_fsm(mi.edges, mi.graph.edges_pdf, mi.graph.labels_pdf,
                           40, budget=BASELINE_BUDGET // 64).result
        except BudgetExceeded:
            return "budget-exceeded"

    out = run_once(benchmark, cell)
    print(f"\n[table4] FCL FSM-40 MI: "
          f"{len(out) if isinstance(out, dict) else out}")


def test_fsm_mi_prg(benchmark, mi):
    run_once(benchmark, lambda: fsm(mi.edges, mi.labels, 40))


@pytest.mark.parametrize("pname", ["p1", "p4", "p5"])
def test_match_pa_prg(benchmark, pa, pname):
    run_once(benchmark, lambda: count_matches(pa.edges, EVAL_PATTERNS[pname]))


@pytest.mark.parametrize("pname", ["p1", "p4", "p5"])
def test_match_pa_fcl(benchmark, pa, pname):
    run_once(benchmark, lambda: dfs_match_pattern(
        pa.edges, pa.graph.edges_pdf, EVAL_PATTERNS[pname],
        budget=BASELINE_BUDGET))


@pytest.mark.parametrize("pname", ["p3", "p6"])
def test_match_mi_prg(benchmark, mi, pname):
    run_once(benchmark, lambda: count_matches(mi.edges, EVAL_PATTERNS[pname]))


def test_match_p3_mi_fcl(benchmark, mi):
    """5-vertex pattern: the oblivious DFS blows its budget ('—')."""
    from repro.baseline.common import BudgetExceeded

    def cell():
        try:
            return dfs_match_pattern(
                mi.edges, mi.graph.edges_pdf, EVAL_PATTERNS["p3"],
                budget=BASELINE_BUDGET // 64).result
        except BudgetExceeded:
            return "budget-exceeded"

    out = run_once(benchmark, cell)
    print(f"\n[table4] FCL match p3 MI: {out}")


def test_match_p1_ok_prg(benchmark, ok):
    run_once(benchmark, lambda: count_matches(ok.edges, EVAL_PATTERNS["p1"]))
