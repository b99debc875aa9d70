"""Benchmark reproducing Table 6 (repro.eval.experiments.table6_seed_propagation)."""
import os

from repro.eval.experiments import table6_seed_propagation


def test_table6_propagation(benchmark, artifacts, results_dir):
    df = benchmark.pedantic(table6_seed_propagation, args=(artifacts,), rounds=1, iterations=1)
    df.to_csv(os.path.join(results_dir, "table6.csv"), index=False)
    print("\n== Table 6 ==")
    print(df.to_string(index=False))
    assert len(df) > 0
