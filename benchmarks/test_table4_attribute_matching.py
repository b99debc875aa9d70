"""Benchmark reproducing Table 4 (repro.eval.experiments.table4_attribute_matching)."""
import os

from repro.eval.experiments import table4_attribute_matching


def test_table4_attribute_matching(benchmark, artifacts, results_dir):
    df = benchmark.pedantic(table4_attribute_matching, args=(artifacts,), rounds=1, iterations=1)
    df.to_csv(os.path.join(results_dir, "table4.csv"), index=False)
    print("\n== Table 4 ==")
    print(df.to_string(index=False))
    assert len(df) > 0
