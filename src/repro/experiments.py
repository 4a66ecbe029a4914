"""Experiment drivers — one function per evaluation table (DESIGN.md §3).

Each driver returns plain rows (lists of dicts) so the ``jobs/``
entrypoints can print them and the benchmarks can assert on their
shapes. Paper-vs-measured numbers are recorded in EXPERIMENTS.md.
"""
from __future__ import annotations

import statistics
import time

from pyspark.sql import SparkSession

from repro import workloads
from repro.core.distillation import contradiction_pruning_steps, distill
from repro.core.pipeline import ground_truth_hit, gt_view_id, run_pipeline
from repro.core.simulated_user import (
    run_fasttopk_session,
    run_ver_session,
    user_population,
)
from repro.corpus import NoiseLevel, noisy_query
from repro.corpus.noise import workload as noisy_workload


# -- Table I: dataset characteristics --------------------------------------

def table1_corpus_stats(spark: SparkSession, bench: bool = False,
                        names: tuple[str, ...] = ("chembl", "wdc",
                                                  "opendata")) -> list[dict]:
    """#Tables / #Columns / #joinable column pairs / #rows / size per
    corpus (paper Table I)."""
    rows = []
    for name in names:
        col, _ = workloads.corpus(name, bench)
        t0 = time.perf_counter()
        idx = workloads.index(spark, name, bench)
        rows.append({
            "dataset": name,
            "n_tables": col.n_tables,
            "n_columns": col.n_columns,
            "n_joinable_pairs": idx.n_joinable_pairs,
            "n_rows": col.n_rows,
            "size_bytes": col.size_bytes(),
            "index_build_s": round(time.perf_counter() - t0, 3),
        })
    return rows


# -- Table II: #views per user-study query (Ver vs FASTTOPK) ---------------

def table2_view_counts(spark: SparkSession, bench: bool = False
                       ) -> list[dict]:
    col, _ = workloads.corpus("wdc", bench)
    idx = workloads.index(spark, "wdc", bench)
    rows = []
    for name, query in workloads.USER_STUDY_QUERIES.items():
        ver = run_pipeline(col, idx, query, strategy="column_selection")
        ftk = run_pipeline(col, idx, query, strategy="select_all")
        rows.append({"query": name, "ver_views": ver.n_views,
                     "fasttopk_views": ftk.n_views})
    return rows


# -- Table III: simulated user study ---------------------------------------

def table3_user_study(spark: SparkSession, bench: bool = False,
                      n_users: int = 18, seed: int = 42,
                      query_names: tuple[str, ...] = ("iata_airports",
                                                      "population")
                      ) -> dict:
    """Simulated within-subjects study: each user solves each study query
    with Ver's presentation and with the FASTTOPK ranking. Returns Q1
    found/not-found counts plus mechanical proxies for Q2/Q3 (preference
    := which system found the view in fewer inspections; confidence :=
    found with Ver)."""
    col, _ = workloads.corpus("wdc", bench)
    idx = workloads.index(spark, "wdc", bench)
    users = user_population(n_users, seed=seed)

    # One pipeline + distillation per distinct study query, shared by all
    # the users assigned to it (the paper's within-subjects setup: each
    # participant solves one study task with both systems).
    prepared = {}
    for qname in query_names:
        query = workloads.USER_STUDY_QUERIES[qname]
        gt_table = workloads.USER_STUDY_GT_TABLE[qname]
        ver = run_pipeline(col, idx, query, strategy="column_selection")
        ftk = run_pipeline(col, idx, query, strategy="select_all")
        gt_ver = next(v.view_id for v in ver.views
                      if v.spec.projection[0].table == gt_table)
        gt_ftk = next(v.view_id for v in ftk.views
                      if v.spec.projection[0].table == gt_table)
        dist = distill(spark, ver.views)
        gt_rep = dist.representatives.get(gt_ver, gt_ver)
        kept = [v for v in ver.views if v.view_id in set(dist.survivors_c2)]
        prepared[qname] = (query, ftk, gt_ftk, dist, gt_rep, kept)

    found_ver = found_ftk = prefer_ver = 0
    interactions: list[int] = []
    for i, user in enumerate(users):
        qname = query_names[i % len(query_names)]
        query, ftk, gt_ftk, dist, gt_rep, kept = prepared[qname]
        s = run_ver_session(kept, dist, user, gt_rep,
                            query_text=qname.replace("_", " "))
        f = run_fasttopk_session(ftk.views, query, user, gt_ftk)
        found_ver += s.found
        found_ftk += f.found
        interactions.append(s.n_interactions)
        if s.found and (not f.found or s.n_interactions < f.n_interactions):
            prefer_ver += 1

    return {
        "n_users": n_users,
        "q1_found_ver": found_ver,
        "q1_found_fasttopk": found_ftk,
        "q2_prefer_ver": prefer_ver,
        "q2_prefer_fasttopk": n_users - prefer_ver,
        "q3_confident_ver": found_ver,        # proxy: found => confident
        "q3_confident_fasttopk": found_ftk,
        "median_interactions_ver": statistics.median(interactions),
    }


# -- Table IV: effect of 4C distillation on #views -------------------------

def table4_distillation(spark: SparkSession, bench: bool = False,
                        min_views: int = 10, max_steps: int = 10
                        ) -> list[dict]:
    """Original / C1 / C2 / C3-worst / C3-best per (query, noise level),
    plus the Fig 2 contradiction-pruning series. Queries producing fewer
    than ``min_views`` original views are excluded, as in the paper."""
    rows = []
    for name in ("chembl", "wdc"):
        col, queries = workloads.corpus(name, bench)
        idx = workloads.index(spark, name, bench)
        for gt in queries:
            for level in NoiseLevel:
                q = noisy_query(col, gt, level, seed=0)
                r = run_pipeline(col, idx, q, spark=spark,
                                 run_distillation=True)
                if r.n_views < min_views:
                    continue
                d = r.distillation
                worst, best = contradiction_pruning_steps(
                    d, max_steps=max_steps)
                rows.append({
                    "query": gt.name,
                    "noise": level.value,
                    "original": r.n_views,
                    "c1": d.after_c1,
                    "c2": d.after_c2,
                    "c3_worst": d.c3_worst,
                    "c3_best": d.c3_best,
                    "n_contradictions": len(d.contradictions),
                    "c4_prune_worst": worst,
                    "c4_prune_best": best,
                    "distill_s": round(r.timings.get("distillation", 0.0), 3),
                })
    return rows


# -- Table V: ground-truth hit ratio ---------------------------------------

def table5_hit_ratio(spark: SparkSession, bench: bool = False,
                     n_per_level: int = 5) -> list[dict]:
    """Hit ratio per (strategy, noise level) over the noisy workload —
    5 samples × 3 levels × ground truths × both corpora (paper: 150)."""
    counters: dict[tuple[str, str], list[int]] = {}
    n_queries = 0
    for name in ("chembl", "wdc"):
        col, queries = workloads.corpus(name, bench)
        idx = workloads.index(spark, name, bench)
        for gt, level, _seed, q in noisy_workload(col, queries,
                                                  n_per_level=n_per_level):
            n_queries += 1
            for strategy in ("select_all", "select_best",
                             "column_selection"):
                r = run_pipeline(col, idx, q, strategy=strategy,
                                 materialize=False)
                hit = ground_truth_hit(r, gt)
                counters.setdefault((strategy, level.value),
                                    []).append(int(hit))
    rows = []
    for (strategy, level), hits in sorted(counters.items()):
        rows.append({
            "strategy": strategy,
            "noise": level,
            "hit_ratio": round(sum(hits) / len(hits), 3),
            "n": len(hits),
        })
    return rows, n_queries


# -- RQ3 search-space stats (Figs 5/6) + runtime shares (Fig 4b) -----------

def search_space_stats(spark: SparkSession, bench: bool = False,
                       corpus_name: str = "wdc",
                       level: NoiseLevel = NoiseLevel.ZERO) -> list[dict]:
    """#joinable groups / #join graphs / #views per strategy — the
    search-space blowup of SELECT-ALL vs COLUMN-SELECTION."""
    col, queries = workloads.corpus(corpus_name, bench)
    idx = workloads.index(spark, corpus_name, bench)
    rows = []
    for gt in queries:
        q = noisy_query(col, gt, level, seed=0)
        for strategy in ("select_all", "column_selection"):
            r = run_pipeline(col, idx, q, strategy=strategy)
            rows.append({
                "query": gt.name,
                "strategy": strategy,
                "joinable_groups": r.search.n_joinable_groups,
                "join_graphs": r.search.n_join_graphs,
                "views": r.n_views,
                "runtime_s": round(sum(r.timings.values()), 3),
            })
    return rows
