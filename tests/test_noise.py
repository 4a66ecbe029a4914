"""Noisy workload generation (Section VI-B)."""
import pytest

from repro.corpus import NoiseLevel, noisy_query
from repro.corpus.noise import N_EXAMPLES_PER_COLUMN, workload


@pytest.mark.parametrize("level,n_noise", [
    (NoiseLevel.ZERO, 0), (NoiseLevel.MEDIUM, 1), (NoiseLevel.HIGH, 2),
])
def test_noise_level_counts(level, n_noise):
    assert level.n_noise == n_noise


@pytest.mark.parametrize("level", list(NoiseLevel))
def test_query_shape(wdc, level):
    col, queries = wdc
    q = noisy_query(col, queries[0], level, seed=1)
    assert q.n_columns == 2
    for values in q.columns:
        assert len(values) == N_EXAMPLES_PER_COLUMN


@pytest.mark.parametrize("qi", range(3))
def test_zero_noise_samples_from_ground_truth(wdc, qi):
    col, queries = wdc
    gt = queries[qi]
    q = noisy_query(col, gt, NoiseLevel.ZERO, seed=3)
    for values, ref in zip(q.columns, gt.gt_columns):
        gt_vals = set(col.tables[ref.table][ref.column].dropna())
        assert set(values) <= gt_vals


@pytest.mark.parametrize("level,expected_noise",
                         [(NoiseLevel.MEDIUM, 1), (NoiseLevel.HIGH, 2)])
def test_noisy_values_come_from_noise_column_exclusive(wdc, level,
                                                       expected_noise):
    col, queries = wdc
    gt = queries[0]
    q = noisy_query(col, gt, level, seed=7)
    for values, ref, noise in zip(q.columns, gt.gt_columns,
                                  gt.noise_columns):
        gt_vals = set(col.tables[ref.table][ref.column].dropna())
        noise_vals = set(col.tables[noise.table][noise.column].dropna())
        noisy = [v for v in values if v not in gt_vals]
        assert len(noisy) == expected_noise
        assert all(v in noise_vals for v in noisy)


def test_deterministic_in_seed(wdc):
    col, queries = wdc
    a = noisy_query(col, queries[1], NoiseLevel.MEDIUM, seed=5)
    b = noisy_query(col, queries[1], NoiseLevel.MEDIUM, seed=5)
    c = noisy_query(col, queries[1], NoiseLevel.MEDIUM, seed=6)
    assert a == b
    assert a != c


def test_workload_size(wdc):
    col, queries = wdc
    w = workload(col, queries, n_per_level=5)
    # 5 gt queries x 3 levels x 5 samples.
    assert len(w) == 75
    levels = {lvl for _, lvl, _, _ in w}
    assert levels == set(NoiseLevel)
