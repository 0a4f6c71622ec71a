"""Table 2 — coreset strategies on classification datasets.

For School (S), Digits and Kraken, compare stratified sampling and
sketching against uniform sampling: the table entries are accuracy change
(percentage points) of each strategy over uniform, per selector.
"""
from __future__ import annotations

import pandas as pd

from repro.core.arda import prepare_batches
from repro.experiments.common import (broadcast_joins, load, make_cfg,
                                      run_method, save_table)

DATASETS = ["school_s", "digits", "kraken"]
SELECTORS = ["f_test", "mutual_info", "random_forest", "sparse_regression",
             "all_features", "rifs", "forward_selection", "linear_svc", "relief"]
METHODS = ["uniform", "stratified", "sketch"]


def run(spark, quick: bool = False, only: list[str] | None = None) -> pd.DataFrame:
    raw = []
    with broadcast_joins(spark):
        for name in (only or DATASETS):
            scenario = load(spark, name, quick, profile="medium")
            per_method: dict[str, dict[str, float]] = {}
            for method in METHODS:
                cfg = make_cfg(quick, coreset_method=method)
                batches, _ = prepare_batches(spark, scenario, cfg)
                scores = {}
                for sel in SELECTORS:
                    r = run_method(spark, scenario, batches, sel, cfg)
                    scores[sel] = r.metric
                per_method[method] = scores
            for sel in SELECTORS:
                raw.append({
                    "dataset": name, "method": sel,
                    "uniform_acc": per_method["uniform"][sel],
                    "stratified_delta_pp":
                        100 * (per_method["stratified"][sel] - per_method["uniform"][sel]),
                    "sketch_delta_pp":
                        100 * (per_method["sketch"][sel] - per_method["uniform"][sel]),
                })
            save_table(pd.DataFrame(raw), "table2_coresets")  # incremental flush
            print(f"[table2] {name}: done", flush=True)
    df = pd.DataFrame(raw)
    save_table(df, "table2_coresets")
    return df
