"""Benchmark regenerating paper Table 6 (micro benchmarks: Kraken, Digits)."""
import os

import pytest

from repro.experiments import table6

QUICK = os.environ.get("REPRO_QUICK", "0") == "1"


@pytest.mark.benchmark(group="table6")
def test_table6_micro(spark, benchmark):
    df = benchmark.pedantic(table6.run, args=(spark,),
                            kwargs={"quick": QUICK}, rounds=1, iterations=1)
    assert set(df["dataset"]) == {"kraken", "digits"}
    by = df.set_index(["dataset", "method"])["metric"]
    # headline shape: selection beats blindly taking all features on kraken
    assert by[("kraken", "rifs")] > by[("kraken", "all_features")]
    print(df.to_string(index=False))
