"""Benchmark regenerating paper Table 4 (TR-rule prefilter for RIFS)."""
import os

import pytest

from repro.experiments import table4

QUICK = os.environ.get("REPRO_QUICK", "0") == "1"


@pytest.mark.benchmark(group="table4")
def test_table4_tuple_ratio(spark, benchmark):
    df = benchmark.pedantic(table4.run, args=(spark,),
                            kwargs={"quick": QUICK}, rounds=1, iterations=1)
    assert (df["tables_removed"] > 0).all()
    assert (df["speedup_x"] > 1.0).all()  # filtering must save time
    print(df.to_string(index=False))
