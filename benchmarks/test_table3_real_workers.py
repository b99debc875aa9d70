"""Benchmark reproducing Table 3 (repro.eval.experiments.table3_real_workers)."""
import os

from repro.eval.experiments import table3_real_workers


def test_table3_real_workers(benchmark, artifacts, results_dir):
    df = benchmark.pedantic(table3_real_workers, args=(artifacts,), rounds=1, iterations=1)
    df.to_csv(os.path.join(results_dir, "table3.csv"), index=False)
    print("\n== Table 3 ==")
    print(df.to_string(index=False))
    assert len(df) > 0
