"""Aurum-style discovery engine substrate (paper Appendix A).

Built from scratch on Spark DataFrames: column profiling, value posting
index, Jaccard-containment joinable-pair computation, and the three API
calls Ver uses — SEARCH-KEYWORD, NEIGHBORS, GENERATE-JOIN-GRAPHS.
"""
from repro.discovery.index import DiscoveryIndex, build_index

__all__ = ["DiscoveryIndex", "build_index"]
