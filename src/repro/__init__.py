"""Reproduction of "Ver: View Discovery in the Wild" (ICDE 2023).

Layout:
    repro.corpus     — pathless-table-collection substrate (synthetic
                       ChEMBL/WDC/OpenData generators + noisy workloads)
    repro.discovery  — Aurum-style discovery index built with Spark
    repro.core       — Ver: column selection, join graph search,
                       materializer, 4C distillation, bandit presentation
    repro.experiments— one driver per evaluation table (I–VI)
    repro.workloads  — shared corpus/index builders for tests & benches
    repro.oracle     — DuckDB result-equality checker
"""
