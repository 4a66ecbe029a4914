"""Synthetic pathless table collections (DESIGN.md §2).

Each generator is deterministic in ``seed`` and parameterized by a
``scale`` knob (≈ the paper's sampling of corpora). Generators return
``(TableCollection, list[GroundTruthQuery])`` so workload generation
(``corpus.noise``) knows the true source columns, the planted noise
columns, and the ground-truth join graph of every query.

Structural properties planted per corpus (they drive the evaluation):

``synth_chembl``  — few, entity-linked tables (paper: 70 tables):
  * ``cell_dictionary`` has a **1-to-1 pair** ``cell_name``↔``cell_description``
    and assay tables carry both, so every assay join materializes twice
    with identical rows → *compatible* views (Table IV C1 insight).
  * ``component_sequences.description`` overlaps ``target_dictionary.pref_name``
    (containment ≥ 0.8) but the value-level mapping is shifted → the
    spurious 1-hop join contradicts the correct 2-hop id path →
    *contradictory* views from wrong join paths (Table IV C4 insight).
  * ``activities_cov_*`` tables have nested molecule coverage →
    *contained* / *complementary* views (C2/C3).
  * one query projects only low-cardinality columns → views with **no
    valid candidate key** → no complementary unions (paper's Q5 insight).

``synth_wdc``  — many small web-style tables (paper: 10k tables):
  * full-coverage vocab columns (states/countries/cities) across many
    tables form one high-score cluster for COLUMN-SELECTION, while
    *distractor* tables mention vocabulary words sparsely among junk —
    SELECT-ALL picks them all, Ver's clustering prunes them (Table II/V).
  * ``state_cov_*`` join-hub tables with nested state coverage →
    contained views; overlapping coverage → complementary (C2/C3).
  * two "camps" of church tables disagree on a slice of states →
    contradictions shared across many views (WDC Q3, Fig 2 insight).

``synth_opendata`` — parametric bulk collection for scalability runs.
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from repro.core.qbe import ColumnRef, GroundTruthQuery
from repro.corpus.collection import TableCollection

# --------------------------------------------------------------------------
# Vocabularies
# --------------------------------------------------------------------------

US_STATES = [
    "Alabama", "Alaska", "Arizona", "Arkansas", "California", "Colorado",
    "Connecticut", "Delaware", "Florida", "Georgia", "Hawaii", "Idaho",
    "Illinois", "Indiana", "Iowa", "Kansas", "Kentucky", "Louisiana",
    "Maine", "Maryland", "Massachusetts", "Michigan", "Minnesota",
    "Mississippi", "Missouri", "Montana", "Nebraska", "Nevada",
    "New Hampshire", "New Jersey", "New Mexico", "New York",
    "North Carolina", "North Dakota", "Ohio", "Oklahoma", "Oregon",
    "Pennsylvania", "Rhode Island", "South Carolina", "South Dakota",
    "Tennessee", "Texas", "Utah", "Vermont", "Virginia", "Washington",
    "West Virginia", "Wisconsin", "Wyoming",
]

TERRITORIES = ["Puerto Rico", "Guam", "American Samoa", "US Virgin Islands",
               "Northern Mariana Islands", "District of Columbia",
               "Midway Atoll", "Wake Island"]

CITIES = [
    "San Diego", "Boston", "Philadelphia", "Chicago", "Houston", "Phoenix",
    "San Antonio", "Dallas", "Austin", "Columbus", "Charlotte", "Seattle",
    "Denver", "Nashville", "Memphis", "Portland", "Detroit", "Baltimore",
    "Milwaukee", "Albuquerque", "Tucson", "Fresno", "Sacramento", "Omaha",
    "Raleigh", "Miami", "Oakland", "Tulsa", "Wichita", "Cleveland",
    "Tampa", "Honolulu", "Anaheim", "Santa Ana", "St. Louis", "Pittsburgh",
    "Cincinnati", "Anchorage", "Plano", "Orlando",
]

COUNTRIES = [
    "China", "Japan", "United States", "India", "Indonesia", "Pakistan",
    "Brazil", "Nigeria", "Bangladesh", "Russia", "Mexico", "Ethiopia",
    "Philippines", "Egypt", "Vietnam", "Turkey", "Iran", "Germany",
    "Thailand", "France", "United Kingdom", "Italy", "South Africa",
    "Tanzania", "Myanmar", "Kenya", "South Korea", "Colombia", "Spain",
    "Argentina", "Uganda", "Ukraine", "Algeria", "Sudan", "Iraq",
    "Afghanistan", "Poland", "Canada", "Morocco", "Saudi Arabia",
    "Uzbekistan", "Peru", "Malaysia", "Angola", "Ghana", "Mozambique",
    "Yemen", "Nepal", "Venezuela", "Madagascar",
]

FAKE_COUNTRIES = ["Atlantis", "Freedonia", "Genovia", "Wakanda", "Elbonia",
                  "Latveria", "Sokovia", "Zubrowka"]

TISSUES = [f"tissue-{i:02d}" for i in range(30)]
ASSAY_TYPES = [f"assay-type-{i:02d}" for i in range(20)]
ORGANISMS = [f"organism-{i:02d}" for i in range(25)]
TARGET_TYPES = ["PROTEIN", "ORGANISM", "CELL-LINE", "TISSUE", "UNKNOWN"]

_JUNK = [f"junk-token-{i:03d}" for i in range(400)]


def _rng(seed: int) -> np.random.Generator:
    return np.random.default_rng(seed)


def _build_codes() -> dict[str, str]:
    """Collision-free deterministic 3-letter codes for states and
    territories. Uniqueness matters: a colliding join key fans out the
    newspaper joins and destroys candidate keys in every view."""
    codes: dict[str, str] = {}
    taken: set[str] = set()
    for name in US_STATES + TERRITORIES:
        up = "".join(ch for ch in name.upper() if ch.isalpha())
        for cand in (up[:2] + up[-1], up[:3], up[0] + up[-2:],
                     up[:2] + "QXZ"[len(taken) % 3]):
            cand = cand.ljust(3, "X")
            if cand not in taken:
                break
        else:  # exhaustive fallback: append a unique suffix letter
            cand = (up[:2] + chr(ord("A") + len(taken) % 26)).ljust(3, "X")
            while cand in taken:
                cand = cand[:2] + chr(ord(cand[2]) + 1)
        taken.add(cand)
        codes[name] = cand
    return codes


_CODES = _build_codes()


def iata_code(state: str) -> str:
    """Deterministic fake 3-letter IATA code per state (collision-free)."""
    return _CODES[state]


def state_code(state: str) -> str:
    """Deterministic join-key code per state (the newspapers join key)."""
    return f"US-{iata_code(state)}"


def church_name(state: str) -> str:
    return f"First Church of {state}"


def newspaper_for_state(state: str) -> str:
    return f"{state} Daily Times"


def newspaper_for_city(city: str) -> str:
    return f"{city} Tribune"


def population_of(country: str) -> str:
    return str(1_000_000 + 137_003 * (sum(map(ord, country)) % 997))


def births_of(country: str) -> str:
    return f"{8 + (sum(map(ord, country)) % 300) / 10.0:.1f}"


def _noise_vocab(gt_vocab: list[str], extras: list[str],
                 g: np.random.Generator, share: float = 0.85) -> list[str]:
    """Vocabulary of a planted *noise column* (VI-B): ``share`` of the
    ground-truth values plus extras, so containment w.r.t. the ground
    truth stays ≥ 0.8 while exclusive values exist to sample noise from."""
    n_shared = max(1, int(round(share * len(gt_vocab))))
    shared = list(g.choice(gt_vocab, size=n_shared, replace=False))
    n_extra = max(1, int(round(len(shared) * (1 - share) / share)))
    return shared + extras[:n_extra]


# --------------------------------------------------------------------------
# WDC-style corpus
# --------------------------------------------------------------------------

def synth_wdc(scale: float = 1.0, seed: int = 7
              ) -> tuple[TableCollection, list[GroundTruthQuery]]:
    """Web-table style collection (paper's WDC subset).

    ``scale=1.0`` ≈ bench size (~400 tables); tests use ``scale≈0.25``.
    """
    g = _rng(seed)
    col = TableCollection(name="wdc")

    n_cov = max(3, int(6 * scale))           # coverage-variant hub tables
    n_fam = max(2, int(6 * scale))           # tables per attribute family
    n_distractors = max(20, int(300 * scale))

    # -- airports family: (State, IATA Code) --------------------------------
    col.add("airports_full", pd.DataFrame(
        {"State": US_STATES, "IATA Code": [iata_code(s) for s in US_STATES]}))
    for i in range(n_fam):
        states = list(g.choice(US_STATES, size=g.integers(35, 50), replace=False))
        col.add(f"airports_{i}", pd.DataFrame(
            {"State": states, "IATA Code": [iata_code(s) for s in states]}))

    # -- churches family with two disagreeing camps: (State, Church) --------
    # Camps agree on `agree` states and use camp-specific church names on
    # the rest -> contradictions (under key State) shared across views.
    # The agreement share keeps cross-camp containment ≥ 0.8 so both camps
    # land in one COLUMN-SELECTION cluster at every noise level.
    agree = US_STATES[:42]
    disputed = US_STATES[42:]
    for camp in (0, 1):
        for i in range(max(2, n_fam // 2)):
            rows = [(s, church_name(s)) for s in agree]
            rows += [(s, f"{'Old' if camp else 'New'} {church_name(s)}")
                     for s in disputed]
            keep = g.random(len(rows)) < 0.95  # slight coverage variation
            rows = [r for r, k in zip(rows, keep) if k]
            col.add(f"churches_v{camp}_{i}",
                    pd.DataFrame(rows, columns=["State", "Church"]))

    # -- newspapers: one shared title table + state-coverage hubs -----------
    # Paper's WDC Q2 insight: the table carrying `Newspaper Title` is the
    # same in every view while the state-coverage table differs; views are
    # contained (nested coverage) or complementary (incomparable
    # coverage). The title table joins through `StateCode` and carries no
    # `State` column — otherwise its single-table view would subsume every
    # joined view and C2 would erase the complementary structure.
    # 44/50 states: random-subset overlap with the 30–34-state coverage
    # hubs keeps StateCode containment ≈ 0.88 ≥ threshold, so every hub
    # joins the title table directly.
    np_states = sorted(g.choice(US_STATES, size=44, replace=False))
    col.add("newspapers_by_state", pd.DataFrame(
        {"StateCode": [state_code(s) for s in np_states],
         "Newspaper Title": [newspaper_for_state(s) for s in np_states]}))
    # Nested coverage chain -> contained views; incomparable random
    # subsets -> complementary views. The chain starts below full
    # coverage so no view dominates all others.
    nested = sorted(g.choice(US_STATES, size=34, replace=False))
    for i in range(n_cov):
        col.add(f"state_cov_{i}", pd.DataFrame(
            {"State": list(nested),
             "StateCode": [state_code(s) for s in nested],
             "Source": [f"portal-{i}-{j}" for j in range(len(nested))]}))
        nested = nested[: max(5, int(len(nested) * 0.75))]
    for i in range(max(2, n_cov // 2)):
        part = sorted(g.choice(US_STATES, size=30, replace=False))
        col.add(f"state_overlap_{i}", pd.DataFrame(
            {"State": part,
             "StateCode": [state_code(s) for s in part],
             "Source": [f"registry-{i}-{j}" for j in range(len(part))]}))

    for i in range(max(2, n_fam // 2)):
        cities = list(g.choice(CITIES, size=g.integers(25, len(CITIES)),
                               replace=False))
        col.add(f"newspapers_city_{i}", pd.DataFrame(
            {"City": cities,
             "Newspaper Title": [newspaper_for_city(c) for c in cities]}))

    # -- countries family: (Country, Population) / (Country, Births) -------
    col.add("country_population", pd.DataFrame(
        {"Country": COUNTRIES,
         "Population": [population_of(c) for c in COUNTRIES]}))
    col.add("country_births", pd.DataFrame(
        {"Country": COUNTRIES,
         "Births per 1000": [births_of(c) for c in COUNTRIES]}))
    for i in range(n_fam):
        cs = list(g.choice(COUNTRIES, size=g.integers(35, len(COUNTRIES)),
                           replace=False))
        col.add(f"countries_{i}", pd.DataFrame(
            {"Country": cs, "Population": [population_of(c) for c in cs]}))

    # -- planted noise columns (≥0.8 containment w.r.t. ground truth) ------
    sn = _noise_vocab(US_STATES, TERRITORIES, g)
    col.add("regions_noisy", pd.DataFrame(
        {"StateName": sn, "Region Code": [f"R{j:03d}" for j in range(len(sn))]}))
    iatas = [iata_code(s) for s in US_STATES]
    ian = _noise_vocab(iatas, ["QQQ", "QQX", "QQZ", "XXQ", "ZZQ", "ZZX", "XQZ",
                               "QZX"], g)
    col.add("codes_noisy", pd.DataFrame(
        {"Airport Code": ian, "Terminal": [f"T{j}" for j in range(len(ian))]}))
    # Built from the actual ground-truth column so containment stays ≥0.8.
    papers = sorted(col.tables["newspapers_by_state"]["Newspaper Title"])
    pn = _noise_vocab(papers, [f"{t} Daily Times" for t in TERRITORIES], g)
    col.add("papers_noisy", pd.DataFrame(
        {"Publication": pn, "Founded": [str(1900 + j) for j in range(len(pn))]}))
    # Noise vocab must track the *ground-truth* column (churches_v0_0
    # carries camp-specific names for disputed states); building it from
    # the canonical names would drop containment below the 0.8 threshold.
    churches = sorted(col.tables["churches_v0_0"]["Church"].unique())
    chn = _noise_vocab(churches, [church_name(t) for t in TERRITORIES], g)
    col.add("churches_noisy", pd.DataFrame(
        {"Parish": chn, "Denomination": [f"denom-{j % 7}" for j in range(len(chn))]}))
    cn = _noise_vocab(COUNTRIES, FAKE_COUNTRIES, g)
    col.add("nations_noisy", pd.DataFrame(
        {"Nation": cn, "ISO": [f"I{j:03d}" for j in range(len(cn))]}))
    pops = [population_of(c) for c in COUNTRIES]
    pon = _noise_vocab(pops, [str(999_000_001 + j) for j in range(10)], g)
    col.add("pop_noisy", pd.DataFrame(
        {"Inhabitants": pon, "Year": [str(2000 + j % 20) for j in range(len(pon))]}))
    births = [births_of(c) for c in COUNTRIES]
    bn = _noise_vocab(births, [f"{60 + j}.9" for j in range(10)], g)
    col.add("births_noisy", pd.DataFrame(
        {"Natality": bn, "Year": [str(2000 + j % 20) for j in range(len(bn))]}))

    # -- state directory tables: full state coverage + junk attributes -----
    # These tie with the ground truth at maximum example overlap and are
    # *larger* (duplicate states with distinct junk payloads), so a flat
    # overlap ranking buries the right view among dozens of lookalikes —
    # the user-study failure mode of FASTTOPK (Table III). Ver's
    # attribute questions prune them quickly instead.
    n_dir = max(6, int(40 * scale))
    for i in range(n_dir):
        states = list(US_STATES) + list(g.choice(US_STATES, size=8,
                                                 replace=False))
        col.add(f"state_directory_{i:02d}", pd.DataFrame(
            {"State": states,
             "Motto": [f"motto-{i}-{j}" for j in range(len(states))],
             "Detail": list(g.choice(_JUNK, size=len(states), replace=True))}))

    # Same decoy construction for the country queries of the user study.
    for i in range(max(4, int(30 * scale))):
        cs = list(COUNTRIES) + list(g.choice(COUNTRIES, size=8,
                                             replace=False))
        col.add(f"country_directory_{i:02d}", pd.DataFrame(
            {"Country": cs,
             "Anthem": [f"anthem-{i}-{j}" for j in range(len(cs))],
             "Detail": list(g.choice(_JUNK, size=len(cs), replace=True))}))

    # -- distractor web tables: vocab words sparsely among junk -------------
    # Each mentions a handful of states/countries/cities inside a junk
    # column, so SELECT-ALL retrieves it but its overlap stays low and its
    # containment w.r.t. real vocab columns stays < 0.8.
    for i in range(n_distractors):
        mentions = list(g.choice(US_STATES, size=5, replace=False))
        mentions += list(g.choice(COUNTRIES, size=3, replace=False))
        mentions += list(g.choice(CITIES, size=2, replace=False))
        junk = list(g.choice(_JUNK, size=20, replace=False))
        text = mentions + junk
        g.shuffle(text)
        col.add(f"web_{i:04d}", pd.DataFrame(
            {"Text": text, "Meta": [f"w{i}-{j}" for j in range(len(text))]}))

    queries = [
        GroundTruthQuery(
            name="wdc_q1_airports",
            gt_columns=[ColumnRef("airports_full", "State"),
                        ColumnRef("airports_full", "IATA Code")],
            noise_columns=[ColumnRef("regions_noisy", "StateName"),
                           ColumnRef("codes_noisy", "Airport Code")],
        ),
        GroundTruthQuery(
            name="wdc_q2_newspapers",
            gt_columns=[ColumnRef("state_cov_0", "State"),
                        ColumnRef("newspapers_by_state", "Newspaper Title")],
            noise_columns=[ColumnRef("regions_noisy", "StateName"),
                           ColumnRef("papers_noisy", "Publication")],
            gt_join=((ColumnRef("state_cov_0", "StateCode"),
                      ColumnRef("newspapers_by_state", "StateCode")),),
        ),
        GroundTruthQuery(
            name="wdc_q3_churches",
            gt_columns=[ColumnRef("churches_v0_0", "State"),
                        ColumnRef("churches_v0_0", "Church")],
            noise_columns=[ColumnRef("regions_noisy", "StateName"),
                           ColumnRef("churches_noisy", "Parish")],
        ),
        GroundTruthQuery(
            name="wdc_q4_population",
            gt_columns=[ColumnRef("country_population", "Country"),
                        ColumnRef("country_population", "Population")],
            noise_columns=[ColumnRef("nations_noisy", "Nation"),
                           ColumnRef("pop_noisy", "Inhabitants")],
        ),
        GroundTruthQuery(
            name="wdc_q5_births",
            gt_columns=[ColumnRef("country_births", "Country"),
                        ColumnRef("country_births", "Births per 1000")],
            noise_columns=[ColumnRef("nations_noisy", "Nation"),
                           ColumnRef("births_noisy", "Natality")],
        ),
    ]
    return col, queries


# --------------------------------------------------------------------------
# ChEMBL-style corpus
# --------------------------------------------------------------------------

def synth_chembl(scale: float = 1.0, seed: int = 11
                 ) -> tuple[TableCollection, list[GroundTruthQuery]]:
    """Entity-linked bio-database style collection (paper's ChEMBL).

    ``scale=1.0`` yields 70 tables (like the paper) with row counts far
    below ChEMBL's 140M — the simulator substitution recorded in
    DESIGN.md §2.
    """
    g = _rng(seed)
    col = TableCollection(name="chembl")

    n_cells = max(30, int(120 * scale))
    n_comp = max(30, int(100 * scale))
    n_mols = max(30, int(100 * scale))
    n_assay_tables = max(3, int(6 * scale))

    # -- cell family: 1-to-1 cell_name <-> cell_description (C1) -----------
    cells = pd.DataFrame({
        "cell_id": [f"CL{i:04d}" for i in range(n_cells)],
        "cell_name": [f"cell-{i:04d}" for i in range(n_cells)],
        "cell_description": [f"description-of-cell-{i:04d}" for i in range(n_cells)],
        "tissue": [TISSUES[i % len(TISSUES)] for i in range(n_cells)],
    })
    col.add("cell_dictionary", cells)
    for i in range(n_assay_tables):
        idx = g.choice(n_cells, size=max(20, int(n_cells * 0.6)), replace=False)
        col.add(f"assays_{i}", pd.DataFrame({
            "assay_id": [f"AS{i}{j:05d}" for j in range(len(idx))],
            "cell_name": cells["cell_name"].iloc[idx].to_list(),
            "cell_description": cells["cell_description"].iloc[idx].to_list(),
            "assay_type": [ASSAY_TYPES[int(j) % len(ASSAY_TYPES)] for j in idx],
            "measure": [f"{(int(j) % 97) / 10.0:.1f}" for j in idx],
        }))

    # -- component family: wrong-join contradictions (C4) -------------------
    # Correct path:  component_sequences ⋈(component_id) target_components
    #                ⋈(tid) target_dictionary  — pairs organism(i) with
    #                pref_name(target(i)) = description(i+1).
    # Spurious path: component_sequences.description = target_dictionary.pref_name
    #                — pairs organism(i+1) with description(i+1).
    # Same key value (pref_name) → different organism rows → contradictory.
    descs = [f"protein-desc-{i:04d}" for i in range(n_comp)]
    orgs = [ORGANISMS[i % len(ORGANISMS)] for i in range(n_comp)]
    col.add("component_sequences", pd.DataFrame({
        "component_id": [f"CO{i:04d}" for i in range(n_comp)],
        "description": descs,
        "organism": orgs,
    }))
    col.add("target_components", pd.DataFrame({
        "component_id": [f"CO{i:04d}" for i in range(n_comp)],
        "tid": [f"TI{i:04d}" for i in range(n_comp)],
    }))
    col.add("target_dictionary", pd.DataFrame({
        "tid": [f"TI{i:04d}" for i in range(n_comp)],
        "pref_name": [descs[(i + 1) % n_comp] for i in range(n_comp)],
        "target_type": [TARGET_TYPES[i % len(TARGET_TYPES)] for i in range(n_comp)],
    }))
    col.add("component_class", pd.DataFrame({
        "component_id": [f"CO{i:04d}" for i in range(n_comp)],
        "protein_class": [f"class-{i % 12}" for i in range(n_comp)],
    }))
    # Partial copies of the target list multiply the (organism, pref_name)
    # views — each copy joins correctly via tid *and* spuriously via
    # description=pref_name, so contradictory view pairs abound (the
    # paper's Q4: "contradictions mainly due to wrong join paths").
    for i in range(max(2, int(4 * scale))):
        keep = g.random(n_comp) < 0.9
        idxs = [j for j in range(n_comp) if keep[j]]
        col.add(f"target_list_{i}", pd.DataFrame({
            "tid": [f"TI{j:04d}" for j in idxs],
            "pref_name": [descs[(j + 1) % n_comp] for j in idxs],
        }))

    # -- molecule family: nested coverage (C2) + overlapping (C3) -----------
    mols = pd.DataFrame({
        "mol_id": [f"MO{i:04d}" for i in range(n_mols)],
        "mol_name": [f"molecule-{i:04d}" for i in range(n_mols)],
        "mol_type": [f"type-{i % 6}" for i in range(n_mols)],
    })
    col.add("molecule_dictionary", mols)
    span = list(range(n_mols))
    for i in range(max(3, int(5 * scale))):          # nested -> contained
        col.add(f"activities_cov_{i}", pd.DataFrame({
            "mol_id": mols["mol_id"].iloc[span].to_list(),
            "activity_type": [ASSAY_TYPES[j % len(ASSAY_TYPES)] for j in span],
        }))
        span = span[: max(10, int(len(span) * 0.7))]
    for i in range(max(3, int(5 * scale))):          # overlapping -> complementary
        idx = sorted(g.choice(n_mols, size=max(15, int(n_mols * 0.5)),
                              replace=False).tolist())
        col.add(f"activities_part_{i}", pd.DataFrame({
            "mol_id": mols["mol_id"].iloc[idx].to_list(),
            "activity_type": [ASSAY_TYPES[j % len(ASSAY_TYPES)] for j in idx],
        }))

    # -- planted noise columns ---------------------------------------------
    tn = _noise_vocab(TISSUES, [f"tissue-x-{j}" for j in range(8)], g)
    col.add("tissue_atlas", pd.DataFrame(
        {"tissue_label": tn, "atlas_id": [f"AT{j:03d}" for j in range(len(tn))]}))
    an = _noise_vocab(ASSAY_TYPES, [f"assay-type-x-{j}" for j in range(6)], g)
    col.add("assay_catalog", pd.DataFrame(
        {"assay_kind": an, "catalog_id": [f"AC{j:03d}" for j in range(len(an))]}))
    on = _noise_vocab(ORGANISMS, [f"organism-x-{j}" for j in range(6)], g)
    col.add("taxonomy", pd.DataFrame(
        {"species": on, "tax_id": [f"TX{j:03d}" for j in range(len(on))]}))
    pn = _noise_vocab([descs[(i + 1) % n_comp] for i in range(n_comp)],
                      [f"protein-x-{j:04d}" for j in range(20)], g)
    col.add("protein_names", pd.DataFrame(
        {"protein_label": pn, "pn_id": [f"PN{j:04d}" for j in range(len(pn))]}))
    mn = _noise_vocab(mols["mol_name"].to_list(),
                      [f"molecule-x-{j:04d}" for j in range(20)], g)
    col.add("compound_names", pd.DataFrame(
        {"compound_label": mn, "cn_id": [f"CN{j:04d}" for j in range(len(mn))]}))
    msr = sorted(col.tables["assays_0"]["measure"].unique())
    mrn = _noise_vocab(msr, [f"{100 + j}.5" for j in range(10)], g)
    col.add("measurements", pd.DataFrame(
        {"reading": mrn, "probe": [f"PR{j:03d}" for j in range(len(mrn))]}))
    ttn = _noise_vocab(TARGET_TYPES, ["COMPLEX", "NUCLEIC-ACID"], g, share=0.8)
    col.add("type_codes", pd.DataFrame(
        {"type_label": ttn, "tc_id": [f"TC{j}" for j in range(len(ttn))]}))

    # -- satellite tables to reach 70 (isolated entity tables) --------------
    target_tables = max(20, int(70 * scale))
    i = 0
    while col.n_tables < target_tables:
        n = int(g.integers(20, 60))
        col.add(f"satellite_{i:02d}", pd.DataFrame({
            "sat_id": [f"S{i:02d}-{j:03d}" for j in range(n)],
            "payload": list(g.choice(_JUNK, size=n, replace=True)),
            "grade": [f"g{int(v)}" for v in g.integers(0, 5, size=n)],
        }))
        i += 1

    queries = [
        GroundTruthQuery(          # C1: compatible views via the 1-to-1 pair
            name="chembl_q1_cell_assay",
            gt_columns=[ColumnRef("cell_dictionary", "tissue"),
                        ColumnRef("assays_0", "assay_type")],
            noise_columns=[ColumnRef("tissue_atlas", "tissue_label"),
                           ColumnRef("assay_catalog", "assay_kind")],
            gt_join=((ColumnRef("cell_dictionary", "cell_name"),
                      ColumnRef("assays_0", "cell_name")),),
        ),
        GroundTruthQuery(          # C2/C3: nested + overlapping coverage
            name="chembl_q2_mol_activity",
            gt_columns=[ColumnRef("molecule_dictionary", "mol_name"),
                        ColumnRef("activities_cov_0", "activity_type")],
            noise_columns=[ColumnRef("compound_names", "compound_label"),
                           ColumnRef("assay_catalog", "assay_kind")],
            gt_join=((ColumnRef("molecule_dictionary", "mol_id"),
                      ColumnRef("activities_cov_0", "mol_id")),),
        ),
        GroundTruthQuery(          # heavy C1 (≈50% compatible, paper Q3)
            name="chembl_q3_cell_measure",
            gt_columns=[ColumnRef("cell_dictionary", "tissue"),
                        ColumnRef("assays_0", "measure")],
            noise_columns=[ColumnRef("tissue_atlas", "tissue_label"),
                           ColumnRef("measurements", "reading")],
            gt_join=((ColumnRef("cell_dictionary", "cell_name"),
                      ColumnRef("assays_0", "cell_name")),),
        ),
        GroundTruthQuery(          # C4: wrong-join contradictions
            name="chembl_q4_organism_target",
            gt_columns=[ColumnRef("component_sequences", "organism"),
                        ColumnRef("target_dictionary", "pref_name")],
            noise_columns=[ColumnRef("taxonomy", "species"),
                           ColumnRef("protein_names", "protein_label")],
            gt_tables=frozenset({"component_sequences", "target_components",
                                 "target_dictionary"}),
            gt_join=((ColumnRef("component_sequences", "component_id"),
                      ColumnRef("target_components", "component_id")),
                     (ColumnRef("target_components", "tid"),
                      ColumnRef("target_dictionary", "tid"))),
        ),
        GroundTruthQuery(          # no candidate keys -> no C3 unions
            name="chembl_q5_organism_type",
            gt_columns=[ColumnRef("component_sequences", "organism"),
                        ColumnRef("target_dictionary", "target_type")],
            noise_columns=[ColumnRef("taxonomy", "species"),
                           ColumnRef("type_codes", "type_label")],
            gt_tables=frozenset({"component_sequences", "target_components",
                                 "target_dictionary"}),
            gt_join=((ColumnRef("component_sequences", "component_id"),
                      ColumnRef("target_components", "component_id")),
                     (ColumnRef("target_components", "tid"),
                      ColumnRef("target_dictionary", "tid"))),
        ),
    ]
    return col, queries


# --------------------------------------------------------------------------
# Open-Data-style corpus (scalability)
# --------------------------------------------------------------------------

def synth_opendata(n_tables: int = 200, seed: int = 23
                   ) -> tuple[TableCollection, list[GroundTruthQuery]]:
    """Bulk open-data portal collection for scalability sweeps (Fig 3 /
    Table I's Open Data row). Tables draw 2–3 columns from a pool of
    shared vocabularies with random coverage, so joinable pairs abound.
    Sampling 25/50/75/100% of tables preserves prefix-inclusion like the
    paper's subsamples (smaller samples are subsets of larger ones).
    """
    g = _rng(seed)
    col = TableCollection(name="opendata")
    vocabs = {
        "State": US_STATES,
        "Country": COUNTRIES,
        "City": CITIES,
        "Agency": [f"agency-{i:03d}" for i in range(80)],
        "Program": [f"program-{i:03d}" for i in range(120)],
        "Category": [f"category-{i:02d}" for i in range(15)],
    }
    names = list(vocabs)
    for i in range(n_tables):
        k = int(g.integers(2, 4))
        picked = list(g.choice(names, size=k, replace=False))
        n_rows = int(g.integers(20, 80))
        data = {}
        for v in picked:
            data[v] = list(g.choice(vocabs[v], size=n_rows, replace=True))
        data["Value"] = [f"{x:.3f}" for x in g.random(n_rows)]
        col.add(f"od_{i:05d}", pd.DataFrame(data))

    # One planted ground truth + noise pair for workload sampling.
    col.add("od_master_states", pd.DataFrame(
        {"State": US_STATES, "Category": [f"category-{i % 15:02d}"
                                          for i in range(len(US_STATES))]}))
    sn = _noise_vocab(US_STATES, TERRITORIES, g)
    col.add("od_states_noisy", pd.DataFrame(
        {"StateName": sn, "Flag": [f"f{j}" for j in range(len(sn))]}))
    queries = [
        GroundTruthQuery(
            name="od_q1_states",
            gt_columns=[ColumnRef("od_master_states", "State"),
                        ColumnRef("od_master_states", "Category")],
            # Category has no planted noisy twin; reusing the ground-truth
            # column keeps that query attribute noise-free, which is fine
            # for the scalability workload (noise is exercised on WDC and
            # ChEMBL workloads).
            noise_columns=[ColumnRef("od_states_noisy", "StateName"),
                           ColumnRef("od_master_states", "Category")],
        ),
    ]
    return col, queries
