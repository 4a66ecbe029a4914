"""Table I — corpus characteristics + offline index-build cost.

The benchmarked operation is the offline discovery-index build (the
scale-bearing Spark job: profiling + value postings + the containment
self-join). The printed rows are the Table I columns.
"""
import pytest

from repro import workloads
from repro.discovery import build_index


@pytest.mark.parametrize("name", ["chembl", "wdc", "opendata"])
def test_table1_index_build(benchmark, spark, name):
    col, _ = workloads.corpus(name, bench=True)

    def build():
        col._cells_cache = None  # force a cold build each round
        return build_index(spark, col)

    idx = benchmark.pedantic(build, rounds=1, iterations=1)
    row = {
        "dataset": name,
        "n_tables": col.n_tables,
        "n_columns": col.n_columns,
        "n_joinable_pairs": idx.n_joinable_pairs,
        "n_rows": col.n_rows,
        "size_mb": round(col.size_bytes() / 2**20, 2),
    }
    print(f"\n[table1] {row}")
    assert idx.n_joinable_pairs > 0
    # Shape vs paper Table I: WDC has far more tables and joinable pairs
    # per table than ChEMBL.
    if name == "wdc":
        assert col.n_tables > 300
