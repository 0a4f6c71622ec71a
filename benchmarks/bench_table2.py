"""Benchmark regenerating paper Table 2 (coreset strategies, classification)."""
import os

import pytest

from repro.experiments import table2

QUICK = os.environ.get("REPRO_QUICK", "0") == "1"


@pytest.mark.benchmark(group="table2")
def test_table2_coresets(spark, benchmark):
    df = benchmark.pedantic(table2.run, args=(spark,),
                            kwargs={"quick": QUICK}, rounds=1, iterations=1)
    assert set(df["dataset"]) == {"school_s", "digits", "kraken"}
    assert {"stratified_delta_pp", "sketch_delta_pp"} <= set(df.columns)
    print(df.to_string(index=False))
