"""Benchmark reproducing Table 8 (repro.eval.experiments.table8_isolated)."""
import os

from repro.eval.experiments import table8_isolated


def test_table8_isolated(benchmark, artifacts, results_dir):
    df = benchmark.pedantic(table8_isolated, args=(artifacts,), rounds=1, iterations=1)
    df.to_csv(os.path.join(results_dir, "table8.csv"), index=False)
    print("\n== Table 8 ==")
    print(df.to_string(index=False))
    assert len(df) > 0
