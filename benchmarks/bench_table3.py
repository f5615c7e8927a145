"""Table 3 cells: PRG vs breadth-first systems (Arabesque 'ABQ' mode,
RStream 'RS' mode) on motifs, cliques and FSM. Representative subset;
the full table (incl. budget-'—' rows) comes from jobs/table3_bfs.py."""
import pytest

from repro.baseline.bfs import bfs_count_cliques, bfs_count_motifs, bfs_fsm
from repro.baseline.common import BudgetExceeded
from repro.core.mining import count_cliques, count_motifs, fsm
from repro.harness import BASELINE_BUDGET

from .conftest import run_once


# -- 3-motifs -------------------------------------------------------------
def test_3motifs_mi_prg(benchmark, mi):
    run_once(benchmark, lambda: count_motifs(mi.edges, 3))


def test_3motifs_mi_abq(benchmark, mi):
    run_once(benchmark, lambda: bfs_count_motifs(
        mi.edges, mi.graph.edges_pdf, 3, mode="abq", budget=BASELINE_BUDGET))


def test_3motifs_mi_rs(benchmark, mi):
    run_once(benchmark, lambda: bfs_count_motifs(
        mi.edges, mi.graph.edges_pdf, 3, mode="rs", budget=BASELINE_BUDGET))


def test_3motifs_pa_prg(benchmark, pa):
    run_once(benchmark, lambda: count_motifs(pa.edges, 3))


def test_3motifs_pa_abq(benchmark, pa):
    run_once(benchmark, lambda: bfs_count_motifs(
        pa.edges, pa.graph.edges_pdf, 3, mode="abq", budget=BASELINE_BUDGET))


def test_3motifs_ok_prg(benchmark, ok):
    run_once(benchmark, lambda: count_motifs(ok.edges, 3))


def test_3motifs_fr_prg(benchmark, fr):
    run_once(benchmark, lambda: count_motifs(fr.edges, 3))


# -- 4-motifs (baselines exhaust their budget here, as the paper's OOM) ---
def test_4motifs_mi_prg(benchmark, mi):
    run_once(benchmark, lambda: count_motifs(mi.edges, 4))


def test_4motifs_mi_abq_budget(benchmark, mi):
    def cell():
        try:
            bfs_count_motifs(mi.edges, mi.graph.edges_pdf, 4, mode="abq",
                             budget=BASELINE_BUDGET)
            return "finished"
        except BudgetExceeded:
            return "budget-exceeded (paper: OOM '—')"

    out = run_once(benchmark, cell)
    print(f"\n[table3] ABQ 4-motifs MI: {out}")


def test_4motifs_pa_prg(benchmark, pa):
    run_once(benchmark, lambda: count_motifs(pa.edges, 4))


# -- cliques --------------------------------------------------------------
@pytest.mark.parametrize("k", [3, 4, 5])
def test_cliques_mi_prg(benchmark, mi, k):
    run_once(benchmark, lambda: count_cliques(mi.edges, k))


@pytest.mark.parametrize("k", [3, 4, 5])
def test_cliques_mi_abq(benchmark, mi, k):
    run_once(benchmark, lambda: bfs_count_cliques(
        mi.edges, mi.graph.edges_pdf, k, mode="abq", budget=BASELINE_BUDGET))


@pytest.mark.parametrize("k", [3, 4])
def test_cliques_pa_rs(benchmark, pa, k):
    run_once(benchmark, lambda: bfs_count_cliques(
        pa.edges, pa.graph.edges_pdf, k, mode="rs", budget=BASELINE_BUDGET))


@pytest.mark.parametrize("k", [3, 4, 5])
def test_cliques_ok_prg(benchmark, ok, k):
    run_once(benchmark, lambda: count_cliques(ok.edges, k))


def test_cliques_fr_prg(benchmark, fr):
    run_once(benchmark, lambda: count_cliques(fr.edges, 4))


# -- FSM ------------------------------------------------------------------
@pytest.mark.parametrize("tau", [40, 30])
def test_fsm_mi_prg(benchmark, mi, tau):
    run_once(benchmark, lambda: fsm(mi.edges, mi.labels, tau))


def test_fsm_mi_abq(benchmark, mi):
    def cell():
        try:
            return bfs_fsm(mi.edges, mi.graph.edges_pdf, mi.graph.labels_pdf,
                           40, budget=BASELINE_BUDGET).result
        except BudgetExceeded:
            return "budget-exceeded"

    out = run_once(benchmark, cell)
    print(f"\n[table3] ABQ FSM-40 MI: "
          f"{len(out) if isinstance(out, dict) else out}")


def test_fsm_pa_prg(benchmark, pa_labeled):
    run_once(benchmark, lambda: fsm(pa_labeled.edges, pa_labeled.labels, 30))
