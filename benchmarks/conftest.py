"""Benchmark fixtures: session-cached lite datasets.

Each ``bench_*`` file covers one paper table with representative
(system × app × graph) cells; the complete tables (every cell, plus the
'—' budget rows) are produced by the ``jobs/`` entrypoints and recorded
in EXPERIMENTS.md. Benchmarks run one round (``benchmark.pedantic``)
because a cell is itself a multi-second Spark pipeline.
"""
from __future__ import annotations

import pytest

from repro.graph import datasets
from repro.harness import SparkGraph


@pytest.fixture(scope="session")
def sparkb(spark):
    spark.conf.set("spark.sql.shuffle.partitions", "32")
    return spark


def _mk(name):
    @pytest.fixture(scope="session")
    def fx(sparkb):
        g = datasets.all_datasets()[name]
        sg = SparkGraph.load(sparkb, g)
        yield sg
        sg.unload()

    return fx


mi = _mk("MI")
pa = _mk("PA")
pa_labeled = _mk("PA-labeled")
ok = _mk("OK")
fr = _mk("FR")


def run_once(benchmark, fn):
    """One timed round — Spark pipelines are seconds-long; repeated
    rounds would only measure cache warmth."""
    return benchmark.pedantic(fn, rounds=1, iterations=1)
