"""Table II benchmark: the Spark correlation aggregation over Glass."""
from __future__ import annotations

from repro.harness.table2 import PAPER_TABLE2, run_table2


def test_table2_correlations(benchmark, spark):
    result = benchmark.pedantic(lambda: run_table2(spark), rounds=3, iterations=1)
    print("\n[table2-bench] attribute correlations vs paper:")
    print(result.to_string(index=False))
    by = dict(zip(result.attribute, result.correlation))
    # the informative attributes reproduce the paper's signs
    assert by["Mg"] < -0.5 and by["Na"] > 0.3 and by["Al"] > 0.3 and by["Ba"] > 0.3
