"""spark-submit entrypoint: Figure 1b/1c profiling counts.

Usage: python jobs/fig1_profile.py   (or spark-submit jobs/fig1_profile.py)
Prints the reproduced table as markdown (see EXPERIMENTS.md).
"""
import json
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).parent))
from _session import get_session

from repro.harness import serialize_rows
from repro.experiments import run_fig1_profile


def main() -> None:
    spark = get_session("fig1_profile")
    md, rows = run_fig1_profile(spark)
    print(md)
    out = Path(__file__).parent.parent / "results"
    out.mkdir(exist_ok=True)
    (out / "fig1_profile.json").write_text(json.dumps(serialize_rows(rows), indent=1))
    spark.stop()


if __name__ == "__main__":
    main()
