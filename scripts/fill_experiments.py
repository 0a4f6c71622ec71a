"""Inject measured results from results/*.csv into EXPERIMENTS.md.

Replaces each ``<!-- TABLEN_MEASURED -->`` placeholder with a markdown
rendering of the corresponding CSV. Idempotent: reruns replace the
previously injected block (delimited by marker comments).
"""
from __future__ import annotations

import re
import sys
from pathlib import Path

import pandas as pd

ROOT = Path(__file__).resolve().parent.parent
CSVS = {
    1: "table1_real_world", 2: "table2_coresets", 3: "table3_sketching",
    4: "table4_tuple_ratio", 5: "table5_grouping", 6: "table6_micro",
}


def _md(df: pd.DataFrame) -> str:
    df = df.copy()
    for c in df.columns:
        if pd.api.types.is_float_dtype(df[c]):
            df[c] = df[c].map(lambda v: f"{v:.3f}" if pd.notna(v) else "")
    header = "| " + " | ".join(df.columns) + " |"
    sep = "|" + "---|" * len(df.columns)
    rows = ["| " + " | ".join(str(v) for v in r) + " |" for r in df.itertuples(index=False)]
    return "\n".join([header, sep] + rows)


def render(n: int) -> str | None:
    path = ROOT / "results" / f"{CSVS[n]}.csv"
    if not path.exists():
        return None
    df = pd.read_csv(path)
    if n == 1:  # pivot to paper layout: method rows x dataset metric/time
        piv = df.pivot_table(index="method", columns="dataset",
                             values=["metric", "time_s"], aggfunc="first")
        piv.columns = [f"{d}_{v.replace('metric', 'm')}" for v, d in piv.columns]
        piv = piv.reset_index()
        return _md(piv)
    return _md(df)


def main() -> int:
    md_path = ROOT / "EXPERIMENTS.md"
    text = md_path.read_text()
    for n in CSVS:
        block = render(n)
        if block is None:
            continue
        start = f"<!-- TABLE{n}_MEASURED -->"
        end = f"<!-- TABLE{n}_MEASURED_END -->"
        payload = f"{start}\n{block}\n{end}"
        if end in text:
            text = re.sub(re.escape(start) + r".*?" + re.escape(end), payload,
                          text, flags=re.S)
        else:
            text = text.replace(start, payload)
    md_path.write_text(text)
    print("EXPERIMENTS.md updated")
    return 0


if __name__ == "__main__":
    sys.exit(main())
