"""Table 6 — recall per error type (T, M, I) on Soccer / Inpatient /
Facilities, for BClean_PI and the baselines."""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).parent))
import pandas as pd

from _common import log, main, scale
from repro.datasets.registry import load_task
from repro.eval.harness import run_method

PAPER = {  # paper Table 6: recall (T, M, I) per dataset
    "BClean_PI": {"soccer": (0.997, 1.000, 0.990),
                  "inpatient": (0.840, 1.000, 0.843),
                  "facilities": (0.683, 0.900, 0.837)},
    "PClean": {"soccer": (1.000, 0.568, 0.953),
               "inpatient": (0.323, 0.760, 0.477),
               "facilities": (0.0, 0.0, 0.0)},
    "HoloClean": {"soccer": (0.749, 1.000, 0.923),
                  "inpatient": (0.954, 0.612, 0.949),
                  "facilities": (0.804, 1.000, 0.851)},
    "Raha+Baran": {"soccer": (0.047, 0.244, 0.018),
                   "inpatient": (0.491, 0.890, 0.109),
                   "facilities": (0.295, 0.501, 0.213)},
}
METHODS = ["BClean_PI", "PClean", "HoloClean", "Raha+Baran"]
SETS = ["soccer", "inpatient", "facilities"]


def run(spark) -> pd.DataFrame:
    rows = []
    # T/M/I only, matching the paper's Table 6 protocol.
    tasks = {n: load_task(n, scale=scale(), error_types=("T", "M", "I"))
             for n in SETS}
    for method in METHODS:
        for name in SETS:
            log(f"{method} on {name} ...")
            r = run_method(spark, method, tasks[name])
            tr = r.type_recall(tasks[name])
            pT, pM, pI = PAPER[method][name]
            rows.append({
                "method": method, "dataset": name,
                "T": round(tr.get("T", 0.0), 3),
                "M": round(tr.get("M", 0.0), 3),
                "I": round(tr.get("I", 0.0), 3),
                "paper_T": pT, "paper_M": pM, "paper_I": pI,
            })
    return pd.DataFrame(rows)


if __name__ == "__main__":
    sys.exit(main(run, "table6"))
