"""Benchmark reproducing Table 5 (repro.eval.experiments.table5_pruning)."""
import os

from repro.eval.experiments import table5_pruning


def test_table5_pruning(benchmark, artifacts, results_dir):
    df = benchmark.pedantic(table5_pruning, args=(artifacts,), rounds=1, iterations=1)
    df.to_csv(os.path.join(results_dir, "table5.csv"), index=False)
    print("\n== Table 5 ==")
    print(df.to_string(index=False))
    assert len(df) > 0
