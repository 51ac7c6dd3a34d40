"""Tables 8–10 — parameter sweeps (λ, β, τ) on Hospital.

Fix two parameters, vary the third, report F1 of BClean_PI — the
paper's stability claim is that F1 barely moves.
"""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).parent))
import pandas as pd

from _common import log, main, scale
from repro.core.cleaner import BClean
from repro.datasets.registry import load_task
from repro.eval.metrics import score_repair

PAPER = {
    "lambda": {0: 0.98096, 1: 0.98096, 2: 0.98096, 5: 0.98096,
               10: 0.98096, 15: 0.98096},
    "beta": {0: 0.97996, 1: 0.98096, 2: 0.98096, 10: 0.98096, 50: 0.98096},
    "tau": {0.1: 0.98096, 0.3: 0.98096, 0.5: 0.98096, 0.7: 0.97996,
            0.9: 0.97996},
}
SWEEPS = {
    "lambda": [0, 1, 2, 5, 10, 15],
    "beta": [0, 1, 2, 10, 50],
    "tau": [0.1, 0.3, 0.5, 0.7, 0.9],
}
DEFAULTS = dict(lam=1.0, beta=2.0, tau=0.5)


def run(spark) -> pd.DataFrame:
    task = load_task("hospital", scale=scale())
    rows = []
    for table, (param, values) in zip(("T8", "T9", "T10"), SWEEPS.items()):
        for v in values:
            kw = dict(DEFAULTS)
            kw["lam" if param == "lambda" else param] = float(v)
            log(f"{param}={v} ...")
            bc = BClean("PI", **kw).fit(
                spark, task.dirty, ucs=task.ucs,
                numeric_attrs=task.numeric_attrs, bn_edits=task.bn_edits)
            f1 = score_repair(task.clean, task.dirty, bc.clean()).f1
            rows.append({"table": table, "param": param, "value": v,
                         "F1": round(f1, 5), "paper_F1": PAPER[param][v]})
    return pd.DataFrame(rows)


if __name__ == "__main__":
    sys.exit(main(run, "table8_10"))
