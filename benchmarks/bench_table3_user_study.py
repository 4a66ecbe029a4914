"""Table III — simulated user study (18 users, Ver vs FASTTOPK).

Benchmarks the full study (pipeline + distillation + 36 interactive
sessions) and asserts the paper's headline: most users find the view
with Ver, few do with the flat overlap ranking.
"""
from repro.experiments import table3_user_study


def test_table3_user_study(benchmark, spark, bench_wdc):
    result = benchmark.pedantic(
        lambda: table3_user_study(spark, bench=True), rounds=1, iterations=1)
    print(f"\n[table3] {result}")
    assert result["n_users"] == 18
    # Paper: 16/18 with Ver vs 6/18 with FASTTOPK.
    assert result["q1_found_ver"] >= 14
    assert result["q1_found_fasttopk"] <= 10
    assert result["q1_found_ver"] > result["q1_found_fasttopk"]
    assert result["median_interactions_ver"] <= 10
