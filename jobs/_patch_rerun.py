"""Maintenance helper: re-run a subset of Table-4 methods and patch
``table4_results.csv`` in place (used after changing one method's
implementation, instead of re-running the whole grid)."""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).parent))
import pandas as pd

from _common import log, main, scale
from repro.datasets.registry import DATASETS, load_task
from repro.eval.harness import run_method

METHODS_TO_RERUN = sys.argv[1].split(",") if len(sys.argv) > 1 else []


def run(spark) -> pd.DataFrame:
    csv = Path(__file__).resolve().parent.parent / "table4_results.csv"
    t4 = pd.read_csv(csv)
    tasks = {n: load_task(n, scale=scale()) for n in DATASETS}
    for method in METHODS_TO_RERUN:
        for name in DATASETS:
            log(f"{method} on {name} ...")
            r = run_method(spark, method, tasks[name])
            s = r.scores
            mask = (t4["method"] == method) & (t4["dataset"] == name)
            t4.loc[mask, ["P", "R", "F1", "exec_s"]] = [
                round(s.precision, 3), round(s.recall, 3),
                round(s.f1, 3), round(r.exec_seconds, 1)]
            log(f"  -> F1={s.f1:.3f} ({r.exec_seconds:.0f}s)")
    t4.to_csv(csv, index=False)
    return t4


if __name__ == "__main__":
    sys.exit(main(run, "table4-patch"))
