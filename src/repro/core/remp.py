"""Remp end-to-end orchestration (paper §III-B workflow).

Two phases:

1. :func:`build_pipeline` — the Spark phase: candidate generation,
   initial matches, attribute matching, similarity vectors, partial-order
   pruning, ER-graph edges, consistency estimation and the probabilistic
   ER graph. Its :class:`PipelineArtifacts` are collected to the driver
   (small after pruning, as in the paper, which runs Algorithms 2–3
   centrally) and are shared by every experiment/baseline so that "all
   methods take the same retained entity matches M_rd as input".

2. :func:`run_crowd_loop` — the human-machine loop: inferred-set
   discovery (Algorithm 2), multiple-question selection (Algorithm 3 or a
   baseline selector), crowd labeling, error-tolerant truth inference,
   match propagation from confirmed matches, until no unresolved pair can
   be inferred; finally the isolated-pair classifier (§VII-B).
"""
from __future__ import annotations

from dataclasses import dataclass, field

import pandas as pd
from pyspark.sql import SparkSession

from repro.core import propagation
from repro.core.attribute_match import attribute_similarities, one_to_one_matching
from repro.core.candidates import candidate_matches, initial_matches
from repro.core.consistency import estimate_consistencies
from repro.core.er_graph import er_edges, with_inverses
from repro.core.isolated import classify_isolated
from repro.core.pruning import partial_order_prune
from repro.core.question_selection import (
    select_max_inf,
    select_max_pr,
    select_questions,
)
from repro.core.simvectors import similarity_vectors
from repro.core.truth_inference import infer_truths
from repro.crowd.workers import WorkerPool
from repro.kb.model import KBPair

Pair = tuple[int, int]


@dataclass
class RempConfig:
    """Paper defaults: k=4, τ=0.9, μ=10, label-sim threshold 0.3."""

    k: int = 4
    tau: float = 0.9
    mu: int = 10
    label_threshold: float = 0.3
    attr_threshold: float = 0.25
    enum_cap: int = 12
    max_loops: int = 500
    budget: int | None = None  # max #questions (the paper's cost constraint)
    selector: str = "benefit"  # "benefit" | "maxinf" | "maxpr"
    use_isolated_classifier: bool = True
    isolated_engine: str = "numpy"
    seed: int = 0


@dataclass
class PipelineArtifacts:
    """Driver-side snapshot of the Spark phase."""

    candidates: pd.DataFrame  # e1, e2, sim
    m_in: pd.DataFrame  # e1, e2
    attr_sims: pd.DataFrame  # a1, a2, sim — full sim_A table (Eq. 1)
    attr_matches: pd.DataFrame  # a1, a2, sim — after the 1:1 constraint
    retained: pd.DataFrame  # e1, e2, sim, svec, pvec  (M_rd)
    edges: pd.DataFrame  # src_e1, src_e2, r1, r2, dst_e1, dst_e2
    consistencies: pd.DataFrame  # r1, r2, eps1, eps2
    prob_edges: pd.DataFrame  # src_e1, src_e2, dst_e1, dst_e2, prob

    def priors(self) -> dict[Pair, float]:
        return {
            (int(a), int(b)): float(s)
            for a, b, s in zip(
                self.retained["e1"], self.retained["e2"], self.retained["sim"]
            )
        }

    def graph_pairs(self) -> set[Pair]:
        """Vertices that occur in at least one ER-graph edge."""
        out: set[Pair] = set()
        for c1, c2 in (("src_e1", "src_e2"), ("dst_e1", "dst_e2")):
            out.update(
                (int(a), int(b)) for a, b in zip(self.edges[c1], self.edges[c2])
            )
        return out


@dataclass
class RempResult:
    matches: set[Pair]
    questions: list[Pair]
    loops: int
    labeled_matches: set[Pair] = field(default_factory=set)
    labeled_non_matches: set[Pair] = field(default_factory=set)
    inferred_matches: set[Pair] = field(default_factory=set)
    classifier_matches: set[Pair] = field(default_factory=set)


def build_pipeline(
    spark: SparkSession, pair: KBPair, cfg: RempConfig | None = None
) -> PipelineArtifacts:
    """Run the Spark phase and collect the (pruned) artifacts."""
    cfg = cfg or RempConfig()
    kb1 = pair.kb1.to_spark(spark)
    kb2 = pair.kb2.to_spark(spark)
    cand = candidate_matches(kb1.entities, kb2.entities, cfg.label_threshold).cache()
    m_in = initial_matches(kb1.entities, kb2.entities).cache()
    attr_sims = attribute_similarities(m_in, kb1.attr_triples, kb2.attr_triples)
    attr_m = one_to_one_matching(attr_sims, cfg.attr_threshold)
    vectors = similarity_vectors(cand, attr_m, kb1.attr_triples, kb2.attr_triples)
    retained_df = partial_order_prune(vectors, cfg.k).cache()
    rels1 = with_inverses(kb1.rel_triples).cache()
    rels2 = with_inverses(kb2.rel_triples).cache()
    edges_df = er_edges(retained_df, rels1, rels2).cache()
    rel_pairs = edges_df.select("r1", "r2").distinct().toPandas()
    cons = estimate_consistencies(m_in, rels1, rels2, cand, rel_pairs)
    prob_edges = propagation.probabilistic_edges(
        edges_df, retained_df, rels1, rels2, cons, cfg.enum_cap
    )
    art = PipelineArtifacts(
        candidates=cand.toPandas(),
        m_in=m_in.toPandas(),
        attr_sims=attr_sims,
        attr_matches=attr_m,
        retained=retained_df.toPandas(),
        edges=edges_df.toPandas(),
        consistencies=cons,
        prob_edges=prob_edges.toPandas(),
    )
    cand.unpersist()
    m_in.unpersist()
    retained_df.unpersist()
    edges_df.unpersist()
    return art


def run_crowd_loop(
    art: PipelineArtifacts, crowd: WorkerPool, cfg: RempConfig | None = None
) -> RempResult:
    """The human-machine loop over the collected probabilistic ER graph."""
    cfg = cfg or RempConfig()
    priors = art.priors()
    graph_pairs = art.graph_pairs()
    inferred = propagation.inferred_sets(
        art.prob_edges, cfg.tau, sources=sorted(graph_pairs)
    )
    adj = propagation._adjacency(art.prob_edges, cfg.tau)

    resolved_m: set[Pair] = set()
    resolved_n: set[Pair] = set()
    asked: set[Pair] = set()
    questions: list[Pair] = []
    loops = 0

    def unresolved(p: Pair) -> bool:
        return p not in resolved_m and p not in resolved_n

    while loops < cfg.max_loops:
        if cfg.budget is not None and len(questions) >= cfg.budget:
            break
        # candidate questions: unresolved, not yet asked, with inference
        # power over at least one other unresolved pair (stop rule §III-B)
        pool: dict[Pair, dict[Pair, float]] = {}
        for q, inf in inferred.items():
            if not unresolved(q) or q in asked:
                continue
            live = {p: pr for p, pr in inf.items() if unresolved(p)}
            if len(live) > 1:  # can infer something beyond itself
                pool[q] = live
        if not pool:
            break
        mu = cfg.mu
        if cfg.budget is not None:
            mu = min(mu, cfg.budget - len(questions))
        if cfg.selector == "benefit":
            batch = select_questions(pool, priors, mu)
        elif cfg.selector == "maxinf":
            un = {p for p in priors if unresolved(p)}
            batch = select_max_inf(pool, un, mu)
        elif cfg.selector == "maxpr":
            un = {p for p in pool if unresolved(p)}
            batch = select_max_pr(priors, un, mu)
        else:
            raise ValueError(f"unknown selector {cfg.selector!r}")
        if not batch:
            break
        votes = {q: crowd.ask(q) for q in batch}
        asked.update(batch)
        questions.extend(batch)
        truths = infer_truths(votes, priors)
        resolved_m |= truths.matches
        resolved_n |= truths.non_matches - resolved_m
        priors.update(truths.hard)  # hard questions: posterior as new prior
        # propagate confirmed matches to unresolved pairs in distance
        reach = propagation.best_path_probs(adj, resolved_m, cfg.tau)
        for p in reach:
            if p not in resolved_n:
                resolved_m.add(p)
        loops += 1

    labeled_m = {q for q in asked if q in resolved_m}
    inferred_m = resolved_m - labeled_m

    classifier_m: set[Pair] = set()
    if cfg.use_isolated_classifier:
        all_pairs = [
            (int(a), int(b))
            for a, b in zip(art.retained["e1"], art.retained["e2"])
        ]
        # every still-unresolved pair: the isolated ones (propagation can
        # never reach them) plus graph leftovers the loop stopped short of
        targets = [p for p in all_pairs if unresolved(p)]
        labels: dict[Pair, bool] = {p: True for p in resolved_m}
        labels.update({p: False for p in resolved_n})
        classifier_m = classify_isolated(
            art.retained, labels, targets, engine=cfg.isolated_engine, seed=cfg.seed
        )

    return RempResult(
        matches=resolved_m | classifier_m,
        questions=questions,
        loops=loops,
        labeled_matches=labeled_m,
        labeled_non_matches={q for q in asked if q in resolved_n},
        inferred_matches=inferred_m,
        classifier_matches=classifier_m,
    )


def run_remp(
    spark: SparkSession,
    pair: KBPair,
    crowd: WorkerPool,
    cfg: RempConfig | None = None,
) -> RempResult:
    """End-to-end Remp: Spark pipeline + crowd loop."""
    cfg = cfg or RempConfig()
    art = build_pipeline(spark, pair, cfg)
    return run_crowd_loop(art, crowd, cfg)


def propagate_from_seeds(
    art: PipelineArtifacts, seeds: set[Pair], tau: float = 0.9
) -> set[Pair]:
    """Remp's match-propagation module alone (Table VI): seed matches plus
    everything reachable with path probability ≥ τ — no crowd loop, no
    isolated-pair classifier."""
    reach = propagation.propagate_driver(art.prob_edges, seeds, tau)
    return set(seeds) | set(reach)
