"""spark-submit entrypoint: Table 1 performance summary.

Derives the paper's Table 1 best/worst-speedup summary from the cells
measured by the Table 3/4/5 and Figure 10 jobs. Reads their saved
``results/*.json`` when present (run jobs/table3_bfs.py etc. first);
otherwise re-runs the workloads.

Usage: python jobs/table1_summary.py
"""
import json
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).parent))
from _session import get_session

from repro.harness import deserialize_rows
from repro.experiments import (
    run_fig10,
    run_table3,
    run_table4,
    run_table5,
    summarize_table1,
)

RESULTS = Path(__file__).parent.parent / "results"
SOURCES = {
    "t3": "table3_bfs",
    "t4": "table4_dfs",
    "t5": "table5_gminer",
    "f10": "fig10_symmetry",
}


def main() -> None:
    saved = {}
    for key, stem in SOURCES.items():
        f = RESULTS / f"{stem}.json"
        if f.exists():
            saved[key] = deserialize_rows(json.loads(f.read_text()))
    if len(saved) < len(SOURCES):
        spark = get_session("table1_summary")
        runners = {"t3": run_table3, "t4": run_table4, "t5": run_table5, "f10": run_fig10}
        for key, fn in runners.items():
            if key not in saved:
                _, saved[key] = fn(spark)
        spark.stop()
    md, _ = summarize_table1(saved["t3"], saved["t4"], saved["t5"], saved["f10"])
    print(md)


if __name__ == "__main__":
    main()
