"""Table IV — effect of 4C distillation on #views (per query × noise).

Benchmarks VIEW-DISTILLATION over the full ChEMBL+WDC noisy-query grid
and asserts the monotone funnel Original ≥ C1 ≥ C2 ≥ C3-worst ≥ C3-best
plus the per-corpus category insights the paper reports.
"""
from repro.experiments import table4_distillation


def test_table4_distillation(benchmark, spark, bench_wdc, bench_chembl):
    rows = benchmark.pedantic(
        lambda: table4_distillation(spark, bench=True), rounds=1,
        iterations=1)
    print()
    for r in rows:
        print(f"[table4] {r['query']:28s} {r['noise']:6s} "
              f"orig={r['original']:4d} C1={r['c1']:4d} C2={r['c2']:4d} "
              f"C3w={r['c3_worst']:4d} C3b={r['c3_best']:4d} "
              f"contr={r['n_contradictions']}")
    assert rows, "no queries above the min-views threshold"
    for r in rows:
        assert (r["original"] >= r["c1"] >= r["c2"]
                >= r["c3_worst"] >= r["c3_best"]), r
    # C1 must bite somewhere (ChEMBL's 1-to-1 key pair) and contradictions
    # must appear (wrong join paths / church camps).
    assert any(r["c1"] < r["original"] for r in rows)
    assert any(r["n_contradictions"] > 0 for r in rows)
    assert any(r["c3_best"] < r["c3_worst"] for r in rows)
