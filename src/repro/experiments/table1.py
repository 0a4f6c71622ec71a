"""Table 1 — real-world datasets x feature selectors: metric + time.

Paper rows: baseline / all-features (our estimator), AutoML comparators,
TR rule standalone, then every selector. Columns per dataset: scaled MAE
(regression) or accuracy (classification), plus selection+evaluation time
in seconds. We report raw MAE; EXPERIMENTS.md maps it against the paper's
x10^k scaled values.
"""
from __future__ import annotations

import pandas as pd

from repro.core.arda import prepare_batches
from repro.experiments.common import (automl_rows, broadcast_joins, load,
                                      make_cfg, run_method, save_table,
                                      selector_list, tr_standalone)

DATASETS = ["taxi", "pickup", "poverty", "school_s", "school_l"]
# TR standalone threshold per dataset (Table 4 tunes tau per dataset; at
# our scale TR = n_base / key-domain-size lands near 1-4 for date/id keys)
TR_TAU = {"taxi": 5.0, "pickup": 2.0, "poverty": 1.5,
          "school_s": 1.5, "school_l": 1.5}


def run(spark, quick: bool = False, only: list[str] | None = None) -> pd.DataFrame:
    rows = []
    with broadcast_joins(spark):
        for name in (only or DATASETS):
            scenario = load(spark, name, quick)
            cfg = make_cfg(quick)
            batches, info = prepare_batches(spark, scenario, cfg)
            rows.append(run_method(spark, scenario, batches, "baseline", cfg).row())
            rows.append(run_method(spark, scenario, batches, "all_features", cfg).row())
            for r in automl_rows(spark, scenario, batches, cfg,
                                 budget_s=5 if quick else 20):
                rows.append(r.row())
            rows.append(tr_standalone(spark, scenario, cfg, TR_TAU[name]).row())
            for sel in selector_list(scenario.task):
                rows.append(run_method(spark, scenario, batches, sel, cfg).row())
            save_table(pd.DataFrame(rows), "table1_real_world")  # incremental flush
            print(f"[table1] {name}: done ({len(rows)} rows so far)", flush=True)
    df = pd.DataFrame(rows)
    save_table(df, "table1_real_world")
    return df
