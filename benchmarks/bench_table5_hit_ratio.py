"""Table V — ground-truth hit ratio (SELECT-ALL / SELECT-BEST /
COLUMN-SELECTION × noise level) over the noisy workload.

Benchmarks the whole 300-run sweep (10 ground truths × 3 levels × 5
samples × 3 strategies, enumeration-only) and asserts the paper's shape:
SA and CS stay ≈1.0 while SB crumbles with noise.
"""
from repro.experiments import table5_hit_ratio


def test_table5_hit_ratio(benchmark, spark, bench_wdc, bench_chembl):
    rows, n_queries = benchmark.pedantic(
        lambda: table5_hit_ratio(spark, bench=True, n_per_level=5),
        rounds=1, iterations=1)
    print(f"\n[table5] workload = {n_queries} noisy queries")
    hit = {(r["strategy"], r["noise"]): r["hit_ratio"] for r in rows}
    for k in sorted(hit):
        print(f"[table5] {k[0]:18s} {k[1]:7s} {hit[k]:.2f}")
    assert n_queries == 150  # paper: 150 noisy queries
    # Zero noise: everyone hits.
    for s in ("select_all", "select_best", "column_selection"):
        assert hit[(s, "zero")] >= 0.95
    # SELECT-ALL is always 1.0; COLUMN-SELECTION stays ≈1.0 under noise.
    assert hit[("select_all", "high")] >= 0.95
    assert hit[("column_selection", "medium")] >= 0.9
    assert hit[("column_selection", "high")] >= 0.85
    # SELECT-BEST crumbles (paper: 0.08 medium / 0.02 high).
    assert hit[("select_best", "medium")] <= 0.4
    assert hit[("select_best", "high")] <= 0.2
