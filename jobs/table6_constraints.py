"""spark-submit entrypoint: Table 6 constrained mining.

Usage: python jobs/table6_constraints.py   (or spark-submit jobs/table6_constraints.py)
Prints the reproduced table as markdown (see EXPERIMENTS.md).
"""
import json
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).parent))
from _session import get_session

from repro.harness import serialize_rows
from repro.experiments import run_table6


def main() -> None:
    spark = get_session("table6_constraints")
    md, rows = run_table6(spark)
    print(md)
    out = Path(__file__).parent.parent / "results"
    out.mkdir(exist_ok=True)
    (out / "table6_constraints.json").write_text(json.dumps(serialize_rows(rows), indent=1))
    spark.stop()


if __name__ == "__main__":
    main()
