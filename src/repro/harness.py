"""Experiment harness: runs (system × application × graph) cells and
renders the paper's evaluation tables.

Each cell is a thunk; ``run_cell`` times it and maps resource
exhaustion (:class:`BudgetExceeded`) to the paper's '—' marker. Table
builders return (markdown string, raw rows) so the jobs can print them
and EXPERIMENTS.md can be assembled from one run.
"""
from __future__ import annotations

import time
from dataclasses import dataclass
from typing import Callable, Optional

from pyspark.sql import DataFrame, SparkSession

from .baseline.common import BudgetExceeded
from .graph.gengraph import Graph

#: Explored-embedding budget for baseline systems: the deterministic
#: laptop-scale analog of the paper's OOM / disk / 5-hour limits.
BASELINE_BUDGET = 2_000_000


@dataclass
class Cell:
    """One measured table cell."""

    seconds: Optional[float]  # None = resource-exhausted ('—')
    value: object = None

    def fmt_time(self) -> str:
        return "—" if self.seconds is None else f"{self.seconds:.2f}"

    def fmt_value(self) -> str:
        return "—" if self.seconds is None else str(self.value)


def run_cell(fn: Callable[[], object]) -> Cell:
    """Time a thunk; budget exhaustion becomes the '—' cell."""
    t0 = time.perf_counter()
    try:
        value = fn()
    except BudgetExceeded:
        return Cell(seconds=None)
    return Cell(seconds=time.perf_counter() - t0, value=value)


@dataclass
class SparkGraph:
    """A dataset loaded into the session: cached symmetric edge table,
    optional cached label table, plus the driver-side pandas copies the
    baselines and oracle need."""

    graph: Graph
    edges: DataFrame
    labels: Optional[DataFrame]

    @staticmethod
    def load(spark: SparkSession, g: Graph) -> "SparkGraph":
        edges = g.to_spark(spark).cache()
        edges.count()
        labels = g.labels_to_spark(spark)
        if labels is not None:
            labels = labels.cache()
            labels.count()
        return SparkGraph(graph=g, edges=edges, labels=labels)

    def unload(self) -> None:
        self.edges.unpersist()
        if self.labels is not None:
            self.labels.unpersist()


def markdown_table(headers: list[str], rows: list[list[str]]) -> str:
    out = ["| " + " | ".join(headers) + " |",
           "|" + "|".join(["---"] * len(headers)) + "|"]
    for r in rows:
        out.append("| " + " | ".join(str(x) for x in r) + " |")
    return "\n".join(out)


def serialize_rows(rows: list[dict]) -> list[dict]:
    """JSON-safe copy of table rows (Cells become {'seconds', 'value'})."""
    out = []
    for r in rows:
        d = {}
        for k, v in r.items():
            d[k] = (
                {"seconds": v.seconds, "value": repr(v.value)}
                if isinstance(v, Cell)
                else v
            )
        out.append(d)
    return out


def deserialize_rows(rows: list[dict]) -> list[dict]:
    """Inverse of :func:`serialize_rows` (values come back as reprs —
    enough for the Table 1 speedup summary, which only needs seconds)."""
    out = []
    for r in rows:
        d = {}
        for k, v in r.items():
            d[k] = (
                Cell(seconds=v["seconds"], value=v.get("value"))
                if isinstance(v, dict) and "seconds" in v
                else v
            )
        out.append(d)
    return out


def speedup(prg: Cell, other: Cell) -> str:
    """other/prg time ratio, or '—' when the other system exhausted its
    budget (the paper's 'fails where Peregrine succeeds')."""
    if other.seconds is None or prg.seconds is None or prg.seconds == 0:
        return "—"
    return f"{other.seconds / prg.seconds:.1f}x"
