"""Simulated-user population and study sessions (Table III substitute)."""
import pandas as pd
import pytest

from repro.core.distillation import distill
from repro.core.qbe import ExampleQuery
from repro.core.simulated_user import (
    SimulatedUser,
    run_fasttopk_session,
    run_ver_session,
    user_population,
)
from tests.test_hashing import _mv


def test_population_size_and_determinism():
    a = user_population(18, seed=42)
    b = user_population(18, seed=42)
    assert len(a) == 18
    assert [u.answer_prob for u in a] == [u.answer_prob for u in b]


def test_population_heterogeneous():
    users = user_population(18, seed=42)
    probs = [u.answer_prob["attribute"] for u in users]
    assert max(probs) - min(probs) > 0.2
    budgets = {u.budget for u in users}
    assert len(budgets) > 3


def test_user_engagement_probabilistic():
    always = SimulatedUser(seed=1, answer_prob={"attribute": 1.0})
    never = SimulatedUser(seed=1, answer_prob={"attribute": 0.0})
    assert all(always.engages("attribute") for _ in range(10))
    assert not any(never.engages("attribute") for _ in range(10))


@pytest.fixture(scope="module")
def study(spark):
    views = [
        _mv(0, pd.DataFrame({"State": ["Georgia", "Indiana"],
                             "IATA Code": ["GAA", "INA"]})),
        _mv(1, pd.DataFrame({"State": ["Georgia", "Indiana"],
                             "Motto": ["m1", "m2"]})),
        _mv(2, pd.DataFrame({"State": ["Georgia", "Ohio"],
                             "Motto": ["m3", "m4"]})),
        _mv(3, pd.DataFrame({"State": ["Georgia"], "Church": ["c1"]})),
    ]
    dist = distill(spark, views)
    return views, dist


def test_perfect_user_finds_ground_truth(study):
    views, dist = study
    user = SimulatedUser(seed=5, answer_prob={i: 1.0 for i in (
        "attribute", "dataset", "dataset_pair", "summary")},
        recognition=1.0)
    res = run_ver_session(views, dist, user, gt_view=0,
                          query_text="IATA Code State")
    assert res.found
    assert res.n_interactions >= 1


def test_non_engaging_user_fails(study):
    views, dist = study
    user = SimulatedUser(seed=5, answer_prob={i: 0.0 for i in (
        "attribute", "dataset", "dataset_pair", "summary")},
        recognition=0.0)
    res = run_ver_session(views, dist, user, gt_view=0, max_iter=10)
    assert not res.found
    assert res.n_interactions == 10


def test_session_never_prunes_ground_truth_with_correct_answers(study):
    views, dist = study
    for seed in range(6):
        user = SimulatedUser(seed=seed, answer_prob={i: 1.0 for i in (
            "attribute", "dataset", "dataset_pair", "summary")},
            recognition=1.0)
        res = run_ver_session(views, dist, user, gt_view=2)
        assert res.found or 2 in res.remaining


def test_fasttopk_budget_limits_found(study):
    views, _ = study
    q = ExampleQuery.of(["Georgia", "Indiana"])
    rich = SimulatedUser(seed=1, answer_prob={}, recognition=1.0, budget=10)
    poor = SimulatedUser(seed=1, answer_prob={}, recognition=1.0, budget=0)
    assert run_fasttopk_session(views, q, rich, gt_view=0).found
    assert not run_fasttopk_session(views, q, poor, gt_view=0).found


def test_fasttopk_found_requires_rank_within_budget(study):
    views, _ = study
    q = ExampleQuery.of(["Georgia", "Indiana"])
    user = SimulatedUser(seed=1, answer_prob={}, recognition=1.0, budget=1)
    # gt view 3 (1 example value) ranks below budget-1 scan.
    res = run_fasttopk_session(views, q, user, gt_view=3)
    assert not res.found
    assert res.n_interactions == 1
