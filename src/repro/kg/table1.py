"""Table 1 reproduction: workload characteristics of RelatedQS-lite.

Rows T1..T10; columns: template share within each temporal split t0..t3
(filter commonality + stability) and the fraction of KG entities
satisfying the template (selectivity ladder).
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from repro.core.types import Dataset, Workload


def workload_characteristics(
    dataset: Dataset, splits: list[Workload]
) -> pd.DataFrame:
    templates = splits[0].templates
    rows = []
    for tid in sorted(templates):
        r: dict = {"template": f"T{tid}"}
        for s, w in enumerate(splits):
            share = float(np.mean(w.qtemplates == tid))
            r[f"t{s}"] = share
        r["feasible_frac"] = float(templates[tid].mask(dataset.pdf).mean())
        rows.append(r)
    return pd.DataFrame(rows)


def format_table1(df: pd.DataFrame) -> str:
    out = ["Template | t0 | t1 | t2 | t3 | feasible entities"]
    out.append("---------|----|----|----|----|------------------")
    for _, r in df.iterrows():
        shares = " | ".join(f"{r[f't{s}'] * 100:4.1f}%" for s in range(4))
        out.append(
            f"{r['template']:>8} | {shares} | {r['feasible_frac'] * 100:.4f}%"
        )
    return "\n".join(out)
