"""Benchmark fixtures run at BENCH scale (workloads.BENCH_SCALE).

The ``spark`` session fixture comes from the repo-root conftest. The
discovery indexes are built once per session (they are the offline jobs
whose cost Table I reports) and reused by every table's benchmark.
"""
import pytest

from repro import workloads


@pytest.fixture(scope="session")
def bench_wdc(spark):
    col, queries = workloads.corpus("wdc", bench=True)
    return col, queries, workloads.index(spark, "wdc", bench=True)


@pytest.fixture(scope="session")
def bench_chembl(spark):
    col, queries = workloads.corpus("chembl", bench=True)
    return col, queries, workloads.index(spark, "chembl", bench=True)
