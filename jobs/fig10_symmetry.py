"""spark-submit entrypoint: Figure 10 symmetry breaking ablation.

Usage: python jobs/fig10_symmetry.py   (or spark-submit jobs/fig10_symmetry.py)
Prints the reproduced table as markdown (see EXPERIMENTS.md).
"""
import json
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).parent))
from _session import get_session

from repro.harness import serialize_rows
from repro.experiments import run_fig10


def main() -> None:
    spark = get_session("fig10_symmetry")
    md, rows = run_fig10(spark)
    print(md)
    out = Path(__file__).parent.parent / "results"
    out.mkdir(exist_ok=True)
    (out / "fig10_symmetry.json").write_text(json.dumps(serialize_rows(rows), indent=1))
    spark.stop()


if __name__ == "__main__":
    main()
