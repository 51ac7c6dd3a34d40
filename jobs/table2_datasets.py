"""Table 2 — dataset statistics (+ Table 3: the UC list).

Prints, per dataset: rows, columns, cells, measured noise rate, error
types, and the number of UCs — next to the paper's numbers — then the
UC definitions themselves (our Table 3).
"""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).parent))
import pandas as pd

from _common import main, scale
from repro.datasets.registry import DATASETS, PAPER_TABLE2, load_task
from repro.datasets.ucs import dataset_ucs


def run(spark=None) -> pd.DataFrame:
    rows = []
    for name in DATASETS:
        t = load_task(name, scale=scale())
        p_rows, p_cols, p_cells, p_rate, p_types, p_ucs = PAPER_TABLE2[name]
        attrs = t.attrs
        n_cells = len(t.dirty) * len(attrs)
        n_err = (t.dirty[attrs].fillna("")
                 != t.clean[attrs].fillna("")).sum().sum()
        rows.append({
            "dataset": name,
            "rows": len(t.dirty), "cols": len(attrs), "cells": n_cells,
            "noise": f"{n_err / n_cells:.1%}",
            "types": "".join(sorted(set(t.errors['type']))),
            "#UCs": len(t.ucs),
            "paper(rows,cols,cells)": f"({p_rows},{p_cols},{p_cells})",
            "paper_noise": f"~{p_rate:.0%}",
            "paper_#UCs": p_ucs,
        })
    out = pd.DataFrame(rows)
    print("== Table 3: user constraints ==")
    for name in DATASETS:
        for attr, uc in dataset_ucs(name).items():
            parts = []
            if uc.pattern:
                parts.append(f"pattern={uc.pattern!r}")
            if uc.min_len is not None:
                parts.append(f"min_len={uc.min_len}")
            if uc.max_len is not None:
                parts.append(f"max_len={uc.max_len}")
            if uc.min_value is not None:
                parts.append(f"min={uc.min_value}")
            if uc.max_value is not None:
                parts.append(f"max={uc.max_value}")
            parts.append("not_null")
            print(f"  {name}.{attr}: {', '.join(parts)}")
    print("\n== Table 2: dataset statistics ==")
    return out


if __name__ == "__main__":
    sys.exit(main(run, "table2"))
