"""Pathless-table-collection substrate.

The paper's corpora (ChEMBL, WDC web tables, Open Data Portal Watch) are
replaced by seeded synthetic collections that preserve the structural
properties the evaluation exercises — see DESIGN.md §2.
"""
from repro.corpus.collection import TableCollection
from repro.corpus.generators import synth_chembl, synth_opendata, synth_wdc
from repro.corpus.noise import NoiseLevel, noisy_query

__all__ = [
    "TableCollection",
    "synth_chembl",
    "synth_wdc",
    "synth_opendata",
    "NoiseLevel",
    "noisy_query",
]
