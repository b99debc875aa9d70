"""Experiment harnesses — one function per evaluation table.

Each ``tableN_*`` function returns a pandas DataFrame whose rows mirror
the corresponding table in the paper; ``jobs/tableN_*.py`` wraps it for
spark-submit and ``benchmarks/test_tableN_*.py`` wraps it for
pytest-benchmark. EXPERIMENTS.md records paper numbers next to one
measured run of each.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession

from repro.baselines.corleone import run_corleone
from repro.baselines.hike import run_hike
from repro.baselines.paris import functionalities, run_paris
from repro.baselines.power import run_power
from repro.baselines.sigma import run_sigma
from repro.core.er_graph import INVERSE_PREFIX
from repro.core.isolated import classify_isolated
from repro.core.pruning import strict_dominance_counts
from repro.core.remp import (
    PipelineArtifacts,
    RempConfig,
    build_pipeline,
    propagate_from_seeds,
    run_crowd_loop,
)
from repro.crowd.workers import PerfectOracle, WorkerPool
from repro.eval.metrics import (
    monotone_error_rate,
    pair_completeness,
    prf,
    reduction_ratio,
)
from repro.kb.model import KBPair
from repro.kb.profiles import PROFILES

Pair = tuple[int, int]


def build_all_artifacts(
    spark: SparkSession, scale: float = 1.0, seed: int = 0, cfg: RempConfig | None = None
) -> dict[str, tuple[KBPair, PipelineArtifacts]]:
    """The Spark phase for every profile — shared by all tables."""
    cfg = cfg or RempConfig()
    out = {}
    for name, fn in PROFILES.items():
        pair = fn(seed=seed, scale=scale)
        out[name] = (pair, build_pipeline(spark, pair, cfg))
    return out


def table2_datasets(
    artifacts: dict[str, tuple[KBPair, PipelineArtifacts]]
) -> pd.DataFrame:
    """Table II: dataset statistics."""
    rows = []
    for name, (pair, _) in artifacts.items():
        s = pair.stats()
        rows.append(
            {
                "dataset": name,
                "entities": f"{s['entities'][0]} / {s['entities'][1]}",
                "attributes": f"{s['attributes'][0]} / {s['attributes'][1]}",
                "relationships": f"{s['relationships'][0]} / {s['relationships'][1]}",
                "matches": s["matches"],
            }
        )
    return pd.DataFrame(rows)


def table3_real_workers(
    artifacts: dict[str, tuple[KBPair, PipelineArtifacts]],
    seed: int = 0,
    cfg: RempConfig | None = None,
) -> pd.DataFrame:
    """Table III: F1 and #questions, Remp vs HIKE/POWER/Corleone, with
    Beta-quality simulated "real" workers and a shared label cache."""
    cfg = cfg or RempConfig()
    rows = []
    for name, (pair, art) in artifacts.items():
        gold = pair.gold_set()
        pool = WorkerPool(gold, n_workers=200, seed=seed)  # shared vote cache
        res = run_crowd_loop(art, pool, cfg)
        _, _, f1 = prf(res.matches, gold)
        row = {"dataset": name, "remp_f1": f1, "remp_q": len(res.questions)}
        m, q = run_hike(art.retained, pool)
        row["hike_f1"] = prf(m, gold)[2]
        row["hike_q"] = q
        m, q = run_power(art.retained, pool)
        row["power_f1"] = prf(m, gold)[2]
        row["power_q"] = q
        m, q = run_corleone(art.retained, pool, seed=seed)
        row["corleone_f1"] = prf(m, gold)[2]
        row["corleone_q"] = q
        rows.append(row)
    return pd.DataFrame(rows)


def table4_attribute_matching(
    artifacts: dict[str, tuple[KBPair, PipelineArtifacts]]
) -> pd.DataFrame:
    """Table IV: attribute matching with / without the 1:1 constraint."""
    from repro.core.attribute_match import threshold_matching

    rows = []
    for name in ("iy_lite", "dy_lite"):
        pair, art = artifacts[name]
        gold = set(zip(pair.gold_attr_matches["a1"], pair.gold_attr_matches["a2"]))
        with_11 = set(zip(art.attr_matches["a1"], art.attr_matches["a2"]))
        # the unconstrained variant re-thresholds the same sim_A table
        no11 = threshold_matching(art.attr_sims)
        without = set(zip(no11["a1"], no11["a2"]))
        p1, r1, f1 = prf(with_11, gold)
        p0, r0, f0 = prf(without, gold)
        rows.append(
            {
                "dataset": name,
                "ref_matches": len(gold),
                "p_11": p1, "r_11": r1, "f1_11": f1,
                "p_no11": p0, "r_no11": r0, "f1_no11": f0,
            }
        )
    return pd.DataFrame(rows)


def table5_pruning(
    artifacts: dict[str, tuple[KBPair, PipelineArtifacts]], k: int = 4
) -> pd.DataFrame:
    """Table V: candidate/retained pair counts, PC, RR, #edges and the
    optimal-monotone-classifier error rate on the retained vectors."""
    rows = []
    for name, (pair, art) in artifacts.items():
        gold = pair.gold_set()
        cand = list(zip(art.candidates["e1"].astype(int), art.candidates["e2"].astype(int)))
        ret = list(zip(art.retained["e1"].astype(int), art.retained["e2"].astype(int)))
        V = np.array(art.retained["svec"].tolist(), dtype=float)
        labels = np.array([p in gold for p in ret])
        # comparability restricted to pairs sharing an entity (paper §VIII-B)
        blocks = []
        for side in (0, 1):
            groups: dict[int, list[int]] = {}
            for i, p in enumerate(ret):
                groups.setdefault(p[side], []).append(i)
            blocks.extend(np.array(g) for g in groups.values() if len(g) > 1)
        err = monotone_error_rate(V, labels, blocks)
        # count forward (non-inverse) edges only, like the paper's Def. 2 graph
        fwd = art.edges[~art.edges["r1"].str.startswith(INVERSE_PREFIX)]
        rows.append(
            {
                "dataset": name,
                "cand_pairs": len(cand),
                "cand_pc": pair_completeness(cand, gold),
                "ret_pairs": len(ret),
                "rr": reduction_ratio(len(cand), len(ret)),
                "ret_pc": pair_completeness(ret, gold),
                "edges": len(fwd),
                "error_rate": err,
            }
        )
    return pd.DataFrame(rows)


def table6_seed_propagation(
    artifacts: dict[str, tuple[KBPair, PipelineArtifacts]],
    portions: tuple[float, ...] = (0.2, 0.4, 0.6, 0.8),
    repeats: int = 3,
    seed: int = 0,
    tau: float = 0.9,
) -> pd.DataFrame:
    """Table VI: propagation-module F1 vs PARIS and SiGMa for varying
    portions of gold matches given as seeds (mean over ``repeats``)."""
    rows = []
    for name, (pair, art) in artifacts.items():
        gold = sorted(pair.gold_set())
        fun1 = functionalities(_rels_with_inv(pair.kb1.rel_triples))
        fun2 = functionalities(_rels_with_inv(pair.kb2.rel_triples))
        for portion in portions:
            scores = {"remp": [], "paris": [], "sigma": []}
            for rep in range(repeats):
                rng = np.random.default_rng(seed * 1000 + rep)
                n_seed = int(len(gold) * portion)
                idx = rng.choice(len(gold), size=n_seed, replace=False)
                seeds = {gold[i] for i in idx}
                gold_set = set(gold)
                scores["remp"].append(
                    prf(propagate_from_seeds(art, seeds, tau), gold_set)[2]
                )
                scores["paris"].append(
                    prf(run_paris(art.edges, art.retained, fun1, fun2, seeds), gold_set)[2]
                )
                scores["sigma"].append(
                    prf(run_sigma(art.edges, art.retained, fun1, fun2, seeds), gold_set)[2]
                )
            rows.append(
                {
                    "dataset": name,
                    "portion": portion,
                    "remp_f1": float(np.mean(scores["remp"])),
                    "paris_f1": float(np.mean(scores["paris"])),
                    "sigma_f1": float(np.mean(scores["sigma"])),
                }
            )
    return pd.DataFrame(rows)


def _rels_with_inv(rel_triples: pd.DataFrame) -> pd.DataFrame:
    inv = rel_triples.rename(columns={"src": "dst", "dst": "src"}).copy()
    inv["rel"] = INVERSE_PREFIX + inv["rel"]
    return pd.concat([rel_triples, inv[["src", "rel", "dst"]]], ignore_index=True)


def table7_multi_questions(
    artifacts: dict[str, tuple[KBPair, PipelineArtifacts]],
    mus: tuple[int, ...] = (1, 5, 10, 20),
) -> pd.DataFrame:
    """Table VII: F1 / #questions / #loops for per-round budgets μ, with
    ground-truth labels (perfect oracle)."""
    rows = []
    for name, (pair, art) in artifacts.items():
        gold = pair.gold_set()
        for mu in mus:
            cfg = RempConfig(mu=mu)
            res = run_crowd_loop(art, PerfectOracle(gold), cfg)
            rows.append(
                {
                    "dataset": name,
                    "mu": mu,
                    "f1": prf(res.matches, gold)[2],
                    "questions": len(res.questions),
                    "loops": res.loops,
                }
            )
    return pd.DataFrame(rows)


def table8_isolated(
    artifacts: dict[str, tuple[KBPair, PipelineArtifacts]],
    seed: int = 0,
    cfg: RempConfig | None = None,
) -> pd.DataFrame:
    """Table VIII: isolated-match share; full-Remp F1 vs a random forest
    trained on the same question labels classifying everything."""
    cfg = cfg or RempConfig()
    rows = []
    for name, (pair, art) in artifacts.items():
        gold = pair.gold_set()
        pool = WorkerPool(gold, n_workers=200, seed=seed)
        res = run_crowd_loop(art, pool, cfg)
        # isolated gold matches: no ER-graph edge touches them
        graph = art.graph_pairs()
        ret = set(zip(art.retained["e1"].astype(int), art.retained["e2"].astype(int)))
        iso_share = (
            sum(1 for g in gold if g not in graph) / len(gold) if gold else 0.0
        )
        # RF-only: same asked labels, classify every other retained pair
        labels: dict[Pair, bool] = {q: True for q in res.labeled_matches}
        labels.update({q: False for q in res.labeled_non_matches})
        targets = [p for p in ret if p not in labels]
        rf_matches = set(res.labeled_matches) | classify_isolated(
            art.retained, labels, targets, seed=seed
        )
        rows.append(
            {
                "dataset": name,
                "isolated_share": iso_share,
                "remp_f1": prf(res.matches, gold)[2],
                "rf_f1": prf(rf_matches, gold)[2],
            }
        )
    return pd.DataFrame(rows)
