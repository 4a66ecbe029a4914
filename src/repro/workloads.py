"""Shared corpus/index builders for tests, benchmarks and jobs.

Corpora are deterministic and cached per process; indexes are cached per
(corpus, threshold) because the offline build is the expensive Spark job
and every table's experiments reuse it.
"""
from __future__ import annotations

from functools import lru_cache

from pyspark.sql import SparkSession

from repro.core.qbe import ExampleQuery, GroundTruthQuery
from repro.corpus import synth_chembl, synth_opendata, synth_wdc
from repro.corpus.collection import TableCollection
from repro.discovery import DiscoveryIndex, build_index

#: Scales used by the pytest suite (small) and the benchmarks (large).
TEST_SCALE = {"wdc": 0.25, "chembl": 0.3, "opendata": 60}
BENCH_SCALE = {"wdc": 1.0, "chembl": 1.0, "opendata": 200}

#: The five user-study queries of Table II (1 column × examples).
USER_STUDY_QUERIES: dict[str, ExampleQuery] = {
    "iata_airports": ExampleQuery.of(
        ["Indiana", "Georgia", "Virginia", "Illinois", "Connecticut"]),
    "churches": ExampleQuery.of(
        ["Indiana", "Georgia", "Virginia", "Illinois", "Connecticut"]),
    "newspapers": ExampleQuery.of(["San Diego", "Boston", "Philadelphia"]),
    "population": ExampleQuery.of(["China", "Japan", "United States"]),
    "births": ExampleQuery.of(["China", "Japan", "United States"]),
}

#: Ground-truth table per user-study query (the view the simulated user
#: is looking for).
USER_STUDY_GT_TABLE = {
    "iata_airports": "airports_full",
    "churches": "churches_v0_0",
    "newspapers": "newspapers_city_0",
    "population": "country_population",
    "births": "country_births",
}


@lru_cache(maxsize=None)
def corpus(name: str, bench: bool = False
           ) -> tuple[TableCollection, list[GroundTruthQuery]]:
    scale = (BENCH_SCALE if bench else TEST_SCALE)[name]
    if name == "wdc":
        return synth_wdc(scale=scale)
    if name == "chembl":
        return synth_chembl(scale=scale)
    if name == "opendata":
        return synth_opendata(n_tables=int(scale))
    raise ValueError(name)


_INDEX_CACHE: dict[tuple[str, bool, float], DiscoveryIndex] = {}


def index(spark: SparkSession, name: str, bench: bool = False,
          threshold: float = 0.8) -> DiscoveryIndex:
    key = (name, bench, threshold)
    if key not in _INDEX_CACHE:
        col, _ = corpus(name, bench)
        _INDEX_CACHE[key] = build_index(spark, col, threshold=threshold)
    return _INDEX_CACHE[key]
