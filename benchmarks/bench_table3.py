"""Benchmark regenerating paper Table 3 (sketching on regression datasets)."""
import os

import pytest

from repro.experiments import table3

QUICK = os.environ.get("REPRO_QUICK", "0") == "1"


@pytest.mark.benchmark(group="table3")
def test_table3_sketching(spark, benchmark):
    df = benchmark.pedantic(table3.run, args=(spark,),
                            kwargs={"quick": QUICK}, rounds=1, iterations=1)
    assert set(df["dataset"]) == {"taxi", "pickup", "poverty"}
    print(df.to_string(index=False))
