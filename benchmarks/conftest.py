"""Benchmark fixtures: one shared Spark phase for all table benchmarks.

REPRO_BENCH_SCALE (default 1.0) shrinks the datasets; the Spark pipeline
runs once per session and the per-table harnesses reuse its artifacts,
mirroring the paper's setup where every method consumes the same retained
match set M_rd.
"""
import os

import pytest

from repro.core.remp import RempConfig
from repro.eval.experiments import build_all_artifacts

BENCH_SCALE = float(os.environ.get("REPRO_BENCH_SCALE", "1.0"))


@pytest.fixture(scope="session")
def artifacts(spark):
    return build_all_artifacts(spark, scale=BENCH_SCALE, seed=0, cfg=RempConfig())


@pytest.fixture(scope="session")
def results_dir():
    d = os.path.join(os.path.dirname(os.path.dirname(__file__)), "bench_results")
    os.makedirs(d, exist_ok=True)
    return d
