"""spark-submit entrypoint: Table 2 dataset statistics.

Usage: python jobs/table2_datasets.py   (or spark-submit jobs/table2_datasets.py)
Prints the reproduced table as markdown (see EXPERIMENTS.md).
"""
import json
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).parent))
from _session import get_session

from repro.harness import serialize_rows
from repro.experiments import run_table2


def main() -> None:
    spark = get_session("table2_datasets")
    md, rows = run_table2(spark)
    print(md)
    out = Path(__file__).parent.parent / "results"
    out.mkdir(exist_ok=True)
    (out / "table2_datasets.json").write_text(json.dumps(serialize_rows(rows), indent=1))
    spark.stop()


if __name__ == "__main__":
    main()
