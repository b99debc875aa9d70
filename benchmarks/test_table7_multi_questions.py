"""Benchmark reproducing Table 7 (repro.eval.experiments.table7_multi_questions)."""
import os

from repro.eval.experiments import table7_multi_questions


def test_table7_multi_questions(benchmark, artifacts, results_dir):
    df = benchmark.pedantic(table7_multi_questions, args=(artifacts,), rounds=1, iterations=1)
    df.to_csv(os.path.join(results_dir, "table7.csv"), index=False)
    print("\n== Table 7 ==")
    print(df.to_string(index=False))
    assert len(df) > 0
