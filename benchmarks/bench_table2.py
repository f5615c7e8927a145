"""Table 2: dataset statistics for the lite stand-ins (printed so
bench_output.txt carries the reproduced table)."""
from repro.experiments import run_table2

from .conftest import run_once


def test_table2_dataset_stats(benchmark):
    md, rows = run_once(benchmark, run_table2)
    print("\n" + md)
