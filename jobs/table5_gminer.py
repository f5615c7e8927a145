"""spark-submit entrypoint: Table 5 PRG vs G-Miner.

Usage: python jobs/table5_gminer.py   (or spark-submit jobs/table5_gminer.py)
Prints the reproduced table as markdown (see EXPERIMENTS.md).
"""
import json
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).parent))
from _session import get_session

from repro.harness import serialize_rows
from repro.experiments import run_table5


def main() -> None:
    spark = get_session("table5_gminer")
    md, rows = run_table5(spark)
    print(md)
    out = Path(__file__).parent.parent / "results"
    out.mkdir(exist_ok=True)
    (out / "table5_gminer.json").write_text(json.dumps(serialize_rows(rows), indent=1))
    spark.stop()


if __name__ == "__main__":
    main()
