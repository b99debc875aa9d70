"""Render EXPERIMENTS.md from bench_results/*.csv next to the paper's numbers.

Run after `pytest benchmarks/ --benchmark-only`:
    python scripts/render_experiments.py
"""
import pathlib

import pandas as pd

ROOT = pathlib.Path(__file__).resolve().parent.parent
RES = ROOT / "bench_results"

NAME = {"iimb_lite": "IIMB", "da_lite": "D-A", "iy_lite": "I-Y", "dy_lite": "D-Y"}

PAPER2 = {
    "IIMB": ("365 / 365", "12 / 12", "15 / 15", "365"),
    "D-A": ("2.61K / 64.3K", "3 / 3", "1 / 1", "5.35K"),
    "I-Y": ("15.1M / 3.04M", "14 / 36", "15 / 33", "77K"),
    "D-Y": ("3.12M / 3.04M", "684 / 36", "688 / 33", "1.31M"),
}
PAPER3 = {  # F1 %, #Q per method
    "IIMB": (95.3, 10, 84.4, 70, 82.4, 70, 94.7, 173),
    "D-A": (97.7, 60, 93.3, 80, 94.8, 70, 94.5, 161),
    "I-Y": (70.9, 110, 68.1, 270, 69.3, 240, 64.5, 402),
    "D-Y": (87.2, 130, 86.4, 500, 84.3, 500, 76.3, 1166),
}
PAPER4 = {
    "I-Y": (4, 100.0, 100.0, 100.0, 40.0, 100.0, 57.1),
    "D-Y": (19, 90.9, 52.6, 66.7, 52.4, 57.9, 55.0),
}
PAPER5 = {
    "IIMB": ("593", 97.8, "516 (13.0%)", 97.8, "1K", 1.91),
    "D-A": ("24.2K", 97.9, "12.4K (49.0%)", 97.7, "7.6K", 0.37),
    "I-Y": ("2.44B", 98.0, "3.86M (99.6%)", 97.4, "0.16M", 0.65),
    "D-Y": ("2.70B", 88.7, "13.1M (99.7%)", 84.8, "5.34M", 1.64),
}
PAPER6 = {  # dataset -> {portion: (remp, paris, sigma)}
    "IIMB": {0.2: (97.5, 96.0, 97.6), 0.4: (98.6, 96.5, 98.6), 0.6: (99.7, 97.0, 99.0), 0.8: (99.7, 97.4, 99.6)},
    "D-A": {0.2: (93.3, 71.3, 92.7), 0.4: (97.2, 79.1, 94.9), 0.6: (98.9, 86.2, 96.7), 0.8: (99.7, 92.5, 98.4)},
    "I-Y": {0.2: (41.2, 34.8, 34.0), 0.4: (63.4, 57.9, 58.5), 0.6: (78.8, 75.4, 76.1), 0.8: (90.6, 89.0, 89.3)},
    "D-Y": {0.2: (83.2, 82.2, 33.6), 0.4: (91.4, 84.7, 57.4), 0.6: (95.0, 87.2, 75.3), 0.8: (99.7, 89.5, 89.1)},
}
PAPER7 = {  # dataset -> {mu: (f1, q, loops)}
    "IIMB": {1: (96.7, 8, 8), 5: (96.7, 10, 2), 10: (96.7, 20, 2), 20: (96.9, 40, 2)},
    "D-A": {1: (97.8, 52, 52), 5: (97.8, 60, 12), 10: (97.7, 60, 6), 20: (97.3, 80, 4)},
    "I-Y": {1: (71.4, 102, 102), 5: (71.3, 105, 21), 10: (71.3, 110, 11), 20: (71.4, 120, 6)},
    "D-Y": {1: (87.3, 127, 127), 5: (87.2, 135, 27), 10: (87.3, 140, 14), 20: (87.2, 160, 8)},
}
PAPER8 = {
    "IIMB": (0.3, 95.3, 0.0),
    "D-A": (0.4, 97.7, 13.7),
    "I-Y": (28.1, 70.9, 66.3),
    "D-Y": (60.4, 87.2, 84.5),
}


def pct(x) -> str:
    return f"{100 * float(x):.1f}%"


def main() -> None:
    t2 = pd.read_csv(RES / "table2.csv")
    t3 = pd.read_csv(RES / "table3.csv")
    t4 = pd.read_csv(RES / "table4.csv")
    t5 = pd.read_csv(RES / "table5.csv")
    t6 = pd.read_csv(RES / "table6.csv")
    t7 = pd.read_csv(RES / "table7.csv")
    t8 = pd.read_csv(RES / "table8.csv")

    out = []
    w = out.append
    w("# EXPERIMENTS — paper numbers vs. this reproduction\n")
    w("Datasets are the synthetic stand-ins of DESIGN.md §4 at scale 1.0 "
      "(hundreds–thousands of entities instead of the paper's millions), so "
      "**absolute sizes differ by design**; compare the *shape* — which "
      "method wins, by roughly what factor, where the crossovers fall. "
      "Workers are simulated (DESIGN.md §5.6). Regenerate any table with "
      "`pytest benchmarks/test_tableN_*.py --benchmark-only` or "
      "`python jobs/tableN_*.py`; this file is rendered by "
      "`python scripts/render_experiments.py`.\n")

    w("## Table II — dataset statistics\n")
    w("| dataset | entities (paper) | entities (ours) | attrs (paper) | attrs (ours) | rels (paper) | rels (ours) | matches (paper) | matches (ours) |")
    w("|---|---|---|---|---|---|---|---|---|")
    for _, r in t2.iterrows():
        n = NAME[r["dataset"]]
        p = PAPER2[n]
        w(f"| {n} | {p[0]} | {r['entities']} | {p[1]} | {r['attributes']} | {p[2]} | {r['relationships']} | {p[3]} | {r['matches']} |")
    w("\nShape preserved: identical schemas on IIMB, one relationship on D-A, "
      "asymmetric narrow/wide schemas on I-Y, many-vs-few attributes on D-Y.\n")

    w("## Table III — F1 and #questions with (simulated) real workers\n")
    w("| dataset | Remp F1 p/ours | Remp #Q p/ours | HIKE F1 p/ours | HIKE #Q p/ours | POWER F1 p/ours | POWER #Q p/ours | Corleone F1 p/ours | Corleone #Q p/ours |")
    w("|---|---|---|---|---|---|---|---|---|")
    for _, r in t3.iterrows():
        n = NAME[r["dataset"]]
        p = PAPER3[n]
        w(
            f"| {n} | {p[0]}% / {pct(r['remp_f1'])} | {p[1]} / {r['remp_q']} "
            f"| {p[2]}% / {pct(r['hike_f1'])} | {p[3]} / {r['hike_q']} "
            f"| {p[4]}% / {pct(r['power_f1'])} | {p[5]} / {r['power_q']} "
            f"| {p[6]}% / {pct(r['corleone_f1'])} | {p[7]} / {r['corleone_q']} |"
        )
    w("\nShape held: Corleone is by far the most question-hungry (~5× Remp, "
      "as in the paper's 161–1166); every method loses F1 on the noisy "
      "confusable I-Y/D-Y profiles; Remp beats HIKE on F1 at comparable or "
      "lower cost. Deviations: our POWER grouping resolves the small "
      "retained sets with unrealistically few questions (the paper's POWER "
      "asks 70–500 — its vector space is far finer at KB scale), and "
      "Corleone's forest handles our low-dimensional non-monotone vectors "
      "better than the paper's rule-based variant, so on I-Y/D-Y those two "
      "baselines reach Remp-level or better F1 — though only by spending "
      "5–30× more questions, which preserves the paper's headline "
      "cost-accuracy trade-off (best accuracy per question for Remp).\n")

    w("## Table IV — attribute matching (with / without the 1:1 constraint)\n")
    w("| dataset | #ref | P 1:1 p/ours | R 1:1 p/ours | F1 1:1 p/ours | P w/o p/ours | R w/o p/ours | F1 w/o p/ours |")
    w("|---|---|---|---|---|---|---|---|")
    for _, r in t4.iterrows():
        n = NAME[r["dataset"]]
        p = PAPER4[n]
        w(
            f"| {n} | {p[0]} / {r['ref_matches']} | {p[1]}% / {pct(r['p_11'])} | {p[2]}% / {pct(r['r_11'])} "
            f"| {p[3]}% / {pct(r['f1_11'])} | {p[4]}% / {pct(r['p_no11'])} | {p[5]}% / {pct(r['r_no11'])} "
            f"| {p[6]}% / {pct(r['f1_no11'])} |"
        )
    w("\nShape: perfect on I-Y (4/4); on D-Y recall is limited (rare and "
      "format-shifted attributes, the paper's icd10 case) and dropping the "
      "1:1 constraint costs precision via synonym attributes.\n")

    w("## Table V — partial-order pruning (k=4)\n")
    w("| dataset | cand pairs p/ours | cand PC p/ours | retained (RR) p/ours | ret PC p/ours | #edges p/ours | error rate p/ours |")
    w("|---|---|---|---|---|---|---|")
    for _, r in t5.iterrows():
        n = NAME[r["dataset"]]
        p = PAPER5[n]
        w(
            f"| {n} | {p[0]} / {r['cand_pairs']} | {p[1]}% / {pct(r['cand_pc'])} "
            f"| {p[2]} / {r['ret_pairs']} ({pct(r['rr'])}) | {p[3]}% / {pct(r['ret_pc'])} "
            f"| {p[4]} / {r['edges']} | {p[5]}% / {pct(r['error_rate'])} |"
        )
    w("\nShape: PC stays within a point of the candidate PC after pruning; "
      "D-Y has the lowest PC (unlabeled entities); the monotone error rate "
      "is near-zero everywhere because the partial order is restricted to "
      "per-entity blocks. RRs are much smaller than the paper's because our "
      "candidate sets are thousands, not billions, of pairs — pruning "
      "pressure scales with block sizes.\n")

    w("## Table VI — propagation-only F1 vs seed portion (no crowd, no classifier)\n")
    w("| dataset | % seeds | Remp p/ours | PARIS p/ours | SiGMa p/ours |")
    w("|---|---|---|---|---|")
    for _, r in t6.iterrows():
        n = NAME[r["dataset"]]
        p = PAPER6[n][round(float(r["portion"]), 1)]
        w(
            f"| {n} | {int(100 * r['portion'])} | {p[0]}% / {pct(r['remp_f1'])} "
            f"| {p[1]}% / {pct(r['paris_f1'])} | {p[2]}% / {pct(r['sigma_f1'])} |"
        )
    w("\nShape: F1 grows with the seed portion for every method; SiGMa "
      "stalls without relational support; PARIS trails on the clean "
      "bibliographic data. Deviation: our Remp column applies the strict "
      "τ=0.9 path filter of the crowd loop, so on the isolation-heavy "
      "I-Y/D-Y (≈28%/60% unreachable matches) it scores below the paper's "
      "Table VI — the paper's propagation-only numbers on D-Y exceed the "
      "reachable-recall ceiling implied by its own Table VIII isolation "
      "shares, suggesting a more permissive propagation variant there.\n")

    w("## Table VII — multiple-questions selection (ground-truth labels)\n")
    w("| dataset | μ | F1 p/ours | #Q p/ours | #loops p/ours |")
    w("|---|---|---|---|---|")
    for _, r in t7.iterrows():
        n = NAME[r["dataset"]]
        p = PAPER7[n][int(r["mu"])]
        w(
            f"| {n} | {int(r['mu'])} | {p[0]}% / {pct(r['f1'])} | {p[1]} / {r['questions']} "
            f"| {p[2]} / {r['loops']} |"
        )
    w("\nShape: F1 is stable in μ; questions grow mildly with μ while loops "
      "drop by roughly μ× — the paper's latency/cost trade-off.\n")

    w("## Table VIII — inference on isolated entity pairs\n")
    w("| dataset | isolated matches p/ours | Remp F1 p/ours | RF-only F1 p/ours |")
    w("|---|---|---|---|")
    for _, r in t8.iterrows():
        n = NAME[r["dataset"]]
        p = PAPER8[n]
        w(
            f"| {n} | {p[0]}% / {pct(r['isolated_share'])} | {p[1]}% / {pct(r['remp_f1'])} "
            f"| {p[2]}% / {pct(r['rf_f1'])} |"
        )
    w("\nShape: the RF alone is useless where almost nothing is isolated "
      "(IIMB, D-A — too few labels to train on) and becomes competitive "
      "with full Remp as the isolated share grows (I-Y, D-Y), exactly the "
      "paper's trend. Our isolated shares are measured on ER-graph vertices "
      "(stricter than entity-level), hence slightly higher than the paper's.\n")

    (ROOT / "EXPERIMENTS.md").write_text("\n".join(out))
    print("wrote", ROOT / "EXPERIMENTS.md")


if __name__ == "__main__":
    main()
