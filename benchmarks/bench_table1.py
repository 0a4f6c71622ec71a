"""Benchmark regenerating paper Table 1 (real-world datasets x selectors).

One pytest-benchmark round runs the full experiment at container scale and
prints the table; results land in results/table1_real_world.csv. Set
REPRO_QUICK=1 to run the smoke-scale variant.
"""
import os

import pytest

from repro.experiments import table1

QUICK = os.environ.get("REPRO_QUICK", "0") == "1"


@pytest.mark.benchmark(group="table1")
def test_table1_real_world(spark, benchmark):
    df = benchmark.pedantic(table1.run, args=(spark,),
                            kwargs={"quick": QUICK}, rounds=1, iterations=1)
    assert {"baseline", "all_features", "rifs"} <= set(df["method"])
    assert set(df["dataset"]) == {"taxi", "pickup", "poverty", "school_s", "school_l"}
    print(df.to_string(index=False))
