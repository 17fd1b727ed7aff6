"""Harnesses that regenerate each evaluation table (DESIGN.md §4).

Every function returns a pandas DataFrame whose rows mirror the paper's
table layout; ``jobs/`` wraps them for spark-submit and EXPERIMENTS.md
records paper-vs-measured values. Parameters default to the scaled-down
settings documented in DESIGN.md §5.4.
"""
from __future__ import annotations

import time

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession

from repro.algorithms.advanced_greedy import advanced_greedy
from repro.algorithms.baseline import baseline_greedy, od_blockers, ra_blockers
from repro.algorithms.exact import exact_blockers, presample_adjacency, shared_sample_spread
from repro.algorithms.greedy_replace import greedy_replace, phase1_out_neighbors
from repro.core.spread import exact_spread
from repro.graphs.datasets import DATASETS, generate_edges, stats_row
from repro.graphs.localgraph import LocalGraph
from repro.graphs.toy import toy_local_graph
from repro.graphs.transform import SUPER_SEED, merge_seeds
from repro.experiments.harness import Workload, assign_model, build_workload, pick_seeds
from repro.experiments.subgraphs import extract_ball, induced_edges


# ----------------------------------------------------------------------
# Table III — toy graph: Greedy vs OutNeighbors vs GreedyReplace
# ----------------------------------------------------------------------
def table3(*, theta: int = 400, seed: int = 0, spark=None) -> pd.DataFrame:
    """Blockers and their (exact) expected spreads on the Fig. 1 graph."""
    g = toy_local_graph()

    def run(algo: str, b: int) -> tuple[str, float]:
        if algo == "Greedy":
            B = advanced_greedy(g, b, theta=theta, seed=seed, spark=spark)
        elif algo == "OutNeighbors":
            B = greedy_replace(g, b, theta=theta, seed=seed, spark=spark, replace=False)
        else:
            B = greedy_replace(g, b, theta=theta, seed=seed, spark=spark)
        blocked = np.zeros(g.n, dtype=bool)
        blocked[B] = True
        names = "{" + ", ".join(f"v{int(g.orig_ids[u])}" for u in B) + "}"
        return names, round(exact_spread(g, blocked), 2)

    rows = []
    for algo in ("Greedy", "OutNeighbors", "GreedyReplace"):
        r: dict = {"Algorithm": algo}
        for b in (1, 2):
            names, spread = run(algo, b)
            r[f"B (b={b})"] = names
            r[f"E (b={b})"] = spread
        rows.append(r)
    return pd.DataFrame(rows)


# ----------------------------------------------------------------------
# Table IV — dataset statistics, paper vs synthetic equivalents
# ----------------------------------------------------------------------
def table4(*, scale: float | None = None, seed: int = 0) -> pd.DataFrame:
    """Paper's Table IV stats next to the synthetic equivalents'."""
    rows = []
    for name, spec in DATASETS.items():
        ours = stats_row(name, scale=scale, seed=seed)
        rows.append(
            {
                "Dataset": name,
                "paper n": spec.n,
                "paper m": spec.m,
                "paper d_avg": spec.d_avg,
                "paper d_max": spec.d_max,
                "ours n": ours["n"],
                "ours m": ours["m"],
                "ours d_avg": ours["d_avg"],
                "ours d_max": ours["d_max"],
                "Type": ours["Type"],
            }
        )
    return pd.DataFrame(rows)


# ----------------------------------------------------------------------
# Tables V / VI — Exact vs GreedyReplace on small subgraphs
# ----------------------------------------------------------------------
def exact_vs_gr(
    spark: SparkSession,
    model: str,
    *,
    n_subgraphs: int = 5,
    n_target: int = 40,
    n_seeds: int = 3,
    budgets: tuple[int, ...] = (1, 2, 3, 4),
    theta: int = 200,
    theta_eval: int = 2000,
    gr_theta: int = 400,
    seed: int = 0,
) -> pd.DataFrame:
    """Exact vs GR: spread, ratio, and running time per budget.

    Subgraphs are neighborhood balls of ~``n_target`` vertices extracted
    from the synthetic EmailCore (paper: ~100-vertex balls, 10 seeds; we
    scale both down because Exact is exponential in b — DESIGN.md §5.4).
    Both algorithms are *scored* on the same ``theta_eval`` pre-sampled
    graphs (common random numbers), mirroring the paper's use of one exact
    spread computation for both columns.
    """
    n_full, edges_full = generate_edges("EmailCore", seed=seed)
    rng = np.random.default_rng((seed, 0xE8))
    acc: dict[int, dict[str, list[float]]] = {
        b: {"exact": [], "gr": [], "t_exact": [], "t_gr": []} for b in budgets
    }
    for si in range(n_subgraphs):
        start = int(rng.integers(0, n_full))
        ball = extract_ball(edges_full, n_full, start=start, n_target=n_target)
        sub = induced_edges(edges_full, ball)
        sub_df = assign_model(
            spark.createDataFrame(sub), model, seed=seed + si
        )
        sub_pdf = sub_df.toPandas()
        seeds = [int(v) for v in rng.choice(ball, size=min(n_seeds, len(ball)), replace=False)]
        merged = merge_seeds(spark.createDataFrame(sub_pdf), seeds)
        g = LocalGraph.from_edges(merged, SUPER_SEED)
        A_eval = presample_adjacency(g, theta=theta_eval, seed=seed * 31 + si)
        base = len(seeds) - 1  # seeds beyond s' count 1 each
        for b in budgets:
            t0 = time.perf_counter()
            B_ex, _ = exact_blockers(g, b, theta=theta, seed=seed + si, spark=spark)
            t_ex = time.perf_counter() - t0
            t0 = time.perf_counter()
            B_gr = greedy_replace(g, b, theta=gr_theta, seed=seed + si, spark=spark)
            t_gr = time.perf_counter() - t0
            acc[b]["exact"].append(base + shared_sample_spread(A_eval, g.seed, B_ex))
            acc[b]["gr"].append(base + shared_sample_spread(A_eval, g.seed, B_gr))
            acc[b]["t_exact"].append(t_ex)
            acc[b]["t_gr"].append(t_gr)
    rows = []
    for b in budgets:
        ex = float(np.mean(acc[b]["exact"]))
        gr = float(np.mean(acc[b]["gr"]))
        rows.append(
            {
                "b": b,
                "Exact spread": round(ex, 3),
                "GR spread": round(gr, 3),
                "Ratio": f"{100 * ex / gr:.2f}%" if gr else "100%",
                "Exact time (s)": round(float(np.mean(acc[b]["t_exact"])), 3),
                "GR time (s)": round(float(np.mean(acc[b]["t_gr"])), 3),
            }
        )
    return pd.DataFrame(rows)


# ----------------------------------------------------------------------
# Table VII — RA / OD / AG / GR expected-spread grid
# ----------------------------------------------------------------------
def table7_cell(
    spark: SparkSession,
    dataset: str,
    model: str,
    *,
    budgets: tuple[int, ...] = (20, 40, 60, 80, 100),
    theta: int = 200,
    r_eval: int = 2000,
    n_seeds: int = 10,
    scale: float | None = None,
    seed: int = 0,
) -> pd.DataFrame:
    """One (dataset, model) block of Table VII: spreads per algorithm × b.

    AG is run once at max(budgets) — its greedy selection is prefix-
    structured, so every smaller budget is a prefix. GR's phase-1 depends
    on b, so it is re-run per budget.
    """
    wl = build_workload(
        spark, dataset, model, scale=scale, n_seeds=n_seeds, seed=seed
    )
    bmax = max(budgets)
    ag_order = [
        int(wl.graph.orig_ids[u])
        for u in advanced_greedy(wl.graph, bmax, theta=theta, seed=seed, spark=spark)
    ]
    # GR phase 1 is prefix-structured: one run at bmax serves every budget.
    p1 = phase1_out_neighbors(
        wl.graph, bmax, theta=theta, seed=seed, spark=spark
    )
    rows = []
    for b in budgets:
        ra = ra_blockers(wl.n_vertices, wl.seeds, b, seed=seed)
        od = od_blockers(wl.edges, wl.seeds, b)
        gr = [
            int(wl.graph.orig_ids[u])
            for u in greedy_replace(
                wl.graph, b, theta=theta, seed=seed, spark=spark, phase1_order=p1
            )
        ]
        spreads = {
            "RA": wl.eval_spread(ra, r=r_eval, seed=seed + 1, spark=spark),
            "OD": wl.eval_spread(od, r=r_eval, seed=seed + 1, spark=spark),
            "AG": wl.eval_spread(ag_order[:b], r=r_eval, seed=seed + 1, spark=spark),
            "GR": wl.eval_spread(gr, r=r_eval, seed=seed + 1, spark=spark),
        }
        rows.append(
            {
                "Dataset": dataset,
                "Model": model,
                "b": b,
                **{k: round(v, 3) for k, v in spreads.items()},
            }
        )
    return pd.DataFrame(rows)


def table7(
    spark: SparkSession,
    *,
    datasets: tuple[str, ...] = tuple(DATASETS),
    models: tuple[str, ...] = ("TR", "WC"),
    budgets: tuple[int, ...] = (20, 40, 60, 80, 100),
    theta: int = 200,
    r_eval: int = 2000,
    n_seeds: int = 10,
    scale: float | None = None,
    seed: int = 0,
) -> pd.DataFrame:
    """Full Table VII grid (8 datasets × 2 models by default)."""
    frames = [
        table7_cell(
            spark,
            d,
            m,
            budgets=budgets,
            theta=theta,
            r_eval=r_eval,
            n_seeds=n_seeds,
            scale=scale,
            seed=seed,
        )
        for m in models
        for d in datasets
    ]
    return pd.concat(frames, ignore_index=True)


# ----------------------------------------------------------------------
# Efficiency claim (Figs. 7/8 as a table): BG vs AG vs GR wall-clock
# ----------------------------------------------------------------------
def efficiency(
    spark: SparkSession,
    *,
    dataset: str = "EmailCore",
    model: str = "TR",
    b: int = 10,
    theta: int = 200,
    r_bg: int = 50,
    scale: float | None = None,
    n_seeds: int = 10,
    seed: int = 0,
) -> pd.DataFrame:
    """Running time of BG vs AG vs GR for one workload (paper: b=10).

    BG's MCS rounds are reduced to ``r_bg`` (the paper's r=10⁴ would take
    days on this substrate exactly as it does for the paper's BG on large
    graphs); the per-candidate enumeration cost that AG removes is what is
    being measured, and it dominates at any r.
    """
    wl = build_workload(
        spark, dataset, model, scale=scale, n_seeds=n_seeds, seed=seed
    )
    rows = []
    t0 = time.perf_counter()
    bg = baseline_greedy(wl.graph, b, r=r_bg, seed=seed, spark=spark)
    t_bg = time.perf_counter() - t0
    t0 = time.perf_counter()
    ag = advanced_greedy(wl.graph, b, theta=theta, seed=seed, spark=spark)
    t_ag = time.perf_counter() - t0
    t0 = time.perf_counter()
    gr = greedy_replace(wl.graph, b, theta=theta, seed=seed, spark=spark)
    t_gr = time.perf_counter() - t0
    for name, tsec, B in (("BG", t_bg, bg), ("AG", t_ag, ag), ("GR", t_gr, gr)):
        B_orig = [int(wl.graph.orig_ids[u]) for u in B]
        rows.append(
            {
                "Algorithm": name,
                "time (s)": round(tsec, 3),
                "spread": round(
                    wl.eval_spread(B_orig, r=2000, seed=seed + 9, spark=spark), 3
                ),
            }
        )
    return pd.DataFrame(rows)
