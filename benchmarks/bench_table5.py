"""Benchmark regenerating paper Table 5 (table grouping strategies)."""
import os

import pytest

from repro.experiments import table5

QUICK = os.environ.get("REPRO_QUICK", "0") == "1"


@pytest.mark.benchmark(group="table5")
def test_table5_grouping(spark, benchmark):
    df = benchmark.pedantic(table5.run, args=(spark,),
                            kwargs={"quick": QUICK}, rounds=1, iterations=1)
    assert {"table_delta_pct", "fullmat_delta_pct"} <= set(df.columns)
    # paper's headline: table-join almost always underperforms budget-join
    assert df["table_delta_pct"].mean() < df["fullmat_delta_pct"].mean() + 5
    print(df.to_string(index=False))
