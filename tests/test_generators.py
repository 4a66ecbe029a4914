"""Synthetic corpus invariants that the experiments rely on (DESIGN.md §2)."""
import pytest

from repro.corpus import synth_chembl, synth_opendata, synth_wdc
from repro.corpus.generators import (
    _CODES,
    TERRITORIES,
    US_STATES,
    iata_code,
    state_code,
)


def _containment(col, noise_ref, gt_ref) -> float:
    """max-direction Jaccard containment between two catalog columns."""
    a = set(col.tables[noise_ref.table][noise_ref.column].dropna())
    b = set(col.tables[gt_ref.table][gt_ref.column].dropna())
    inter = len(a & b)
    return max(inter / len(a), inter / len(b))


def test_codes_unique():
    assert len(set(_CODES.values())) == len(US_STATES) + len(TERRITORIES)


def test_iata_and_state_code_deterministic():
    assert iata_code("Georgia") == iata_code("Georgia")
    assert state_code("Georgia") == f"US-{iata_code('Georgia')}"


class TestWdc:
    @pytest.fixture(autouse=True)
    def _setup(self, wdc):
        self.col, self.queries = wdc

    def test_deterministic(self):
        col2, _ = synth_wdc(scale=0.25)
        assert col2.n_tables == self.col.n_tables
        assert col2.n_rows == self.col.n_rows

    def test_scale_grows_tables(self):
        big, _ = synth_wdc(scale=0.5)
        assert big.n_tables > self.col.n_tables

    def test_ground_truth_columns_exist(self):
        for gt in self.queries:
            for ref in gt.gt_columns + gt.noise_columns:
                assert ref.column in self.col.tables[ref.table].columns, gt.name

    @pytest.mark.parametrize("qi", range(5))
    @pytest.mark.parametrize("ci", range(2))
    def test_noise_columns_have_high_containment(self, qi, ci):
        # VI-B requires the noise column to have Jaccard containment ≥0.8
        # w.r.t. the ground-truth column (else the noise model is vacuous).
        gt = self.queries[qi]
        noise, ref = gt.noise_columns[ci], gt.gt_columns[ci]
        if noise == ref:
            pytest.skip("noise-free query attribute")
        assert _containment(self.col, noise, ref) >= 0.8, gt.name

    @pytest.mark.parametrize("qi", range(5))
    def test_noise_columns_have_exclusive_values(self, qi):
        gt = self.queries[qi]
        for noise, ref in zip(gt.noise_columns, gt.gt_columns):
            if noise == ref:
                continue
            nv = set(self.col.tables[noise.table][noise.column].dropna())
            gv = set(self.col.tables[ref.table][ref.column].dropna())
            assert nv - gv, f"{gt.name}: no values to sample noise from"

    def test_church_camps_disagree(self):
        c0 = self.col.tables["churches_v0_0"].set_index("State")["Church"]
        c1 = self.col.tables["churches_v1_0"].set_index("State")["Church"]
        common = c0.index.intersection(c1.index)
        diffs = (c0.loc[common] != c1.loc[common]).sum()
        assert diffs > 0, "camps must contradict on some states"
        assert diffs < len(common), "camps must also agree on most states"

    def test_newspaper_titles_join_key_only(self):
        np = self.col.tables["newspapers_by_state"]
        assert "State" not in np.columns
        assert {"StateCode", "Newspaper Title"} <= set(np.columns)
        # Join key is unique: no fan-out on the title side.
        assert np["StateCode"].is_unique

    def test_state_cov_nested_coverage(self):
        s0 = set(self.col.tables["state_cov_0"]["State"])
        s1 = set(self.col.tables["state_cov_1"]["State"])
        assert s1 < s0

    def test_state_directories_are_large_and_full_coverage(self):
        t = self.col.tables["state_directory_00"]
        assert set(US_STATES) <= set(t["State"])
        assert len(t) > len(US_STATES)

    def test_distractors_mention_vocab_sparsely(self):
        t = self.col.tables["web_0000"]
        states = set(t["Text"]) & set(US_STATES)
        assert 1 <= len(states) <= 8
        assert len(set(t["Text"])) > 3 * len(states)


class TestChembl:
    @pytest.fixture(autouse=True)
    def _setup(self, chembl):
        self.col, self.queries = chembl

    def test_table_count_scales_to_70_at_full_scale(self):
        full, _ = synth_chembl(scale=1.0)
        assert full.n_tables == 70

    def test_cell_name_description_one_to_one(self):
        cd = self.col.tables["cell_dictionary"]
        assert cd["cell_name"].is_unique
        assert cd["cell_description"].is_unique

    def test_assays_carry_both_cell_keys(self):
        a = self.col.tables["assays_0"]
        assert {"cell_name", "cell_description"} <= set(a.columns)

    def test_spurious_join_is_shifted(self):
        # pref_name(t_i) == description(c_{i+1}): the 1-hop description
        # join pairs the wrong organism with each pref_name.
        cs = self.col.tables["component_sequences"]
        td = self.col.tables["target_dictionary"]
        descs = cs["description"].tolist()
        assert td["pref_name"].iloc[0] == descs[1]

    @pytest.mark.parametrize("qi", range(5))
    @pytest.mark.parametrize("ci", range(2))
    def test_noise_columns_have_high_containment(self, qi, ci):
        gt = self.queries[qi]
        noise, ref = gt.noise_columns[ci], gt.gt_columns[ci]
        if noise == ref:
            pytest.skip("noise-free query attribute")
        assert _containment(self.col, noise, ref) >= 0.8, gt.name

    def test_activities_nested_coverage(self):
        a0 = set(self.col.tables["activities_cov_0"]["mol_id"])
        a1 = set(self.col.tables["activities_cov_1"]["mol_id"])
        assert a1 < a0

    def test_activities_partitions_overlap(self):
        p0 = set(self.col.tables["activities_part_0"]["mol_id"])
        p1 = set(self.col.tables["activities_part_1"]["mol_id"])
        assert p0 & p1
        assert not (p0 <= p1 or p1 <= p0)


class TestOpenData:
    def test_prefix_inclusion_for_subsamples(self):
        # The paper subsamples 25/50/75% such that smaller samples are
        # subsets of larger ones; our generator guarantees it by table
        # naming (od_00000..od_N in creation order).
        small, _ = synth_opendata(n_tables=20)
        big, _ = synth_opendata(n_tables=40)
        small_names = [n for n in small.tables if n.startswith("od_0")]
        for name in small_names:
            assert name in big.tables
            assert small.tables[name].equals(big.tables[name])

    def test_has_ground_truth(self, opendata):
        col, queries = opendata
        assert queries and queries[0].gt_columns[0].table in col.tables
