"""Benchmark reproducing Table 2 (repro.eval.experiments.table2_datasets)."""
import os

from repro.eval.experiments import table2_datasets


def test_table2_datasets(benchmark, artifacts, results_dir):
    df = benchmark.pedantic(table2_datasets, args=(artifacts,), rounds=1, iterations=1)
    df.to_csv(os.path.join(results_dir, "table2.csv"), index=False)
    print("\n== Table 2 ==")
    print(df.to_string(index=False))
    assert len(df) > 0
