"""VIEW-PRESENTATION (Algorithm 2): interfaces, bandit, utility ranking."""
import math

import pandas as pd
import pytest

from repro.core.distillation import distill
from repro.core.presentation import (
    INTERFACES,
    PresentationSession,
    _token_distance,
)
from tests.test_hashing import _mv


@pytest.fixture()
def session(spark):
    views = [
        _mv(0, pd.DataFrame({"k": ["1", "2"], "v": ["a", "b"]})),
        _mv(1, pd.DataFrame({"k": ["1", "3"], "v": ["a", "c"]})),
        _mv(2, pd.DataFrame({"x": ["9"], "y": ["z"]})),
        _mv(3, pd.DataFrame({"x": ["8"], "y": ["w"]})),
    ]
    dist = distill(spark, views)
    return PresentationSession(views, dist, query_text="k v", seed=0), views


@pytest.mark.parametrize("name", INTERFACES)
def test_interfaces_registered(name):
    assert name in INTERFACES


@pytest.mark.parametrize("a,b,expected", [
    ("home address", "home address", 0.0),
    ("home address", "work address", 2 / 3),  # |∩|=1, |∪|=3
    ("alpha", "beta", 1.0),
    ("", "x", 1.0),
])
def test_token_distance(a, b, expected):
    assert _token_distance(a, b) == pytest.approx(expected)


def test_attribute_question_balanced_gain(session):
    s, _ = session
    q = s._question_attribute()
    assert q is not None
    # attrs k/v split 2-2, x/y split 2-2: minimax gain 2.
    assert q.gain == 2


def test_attribute_answer_yes_prunes_views_without(session):
    s, _ = session
    q = s._question_attribute()
    s.answer(q, True)
    attr = q.payload
    assert all(attr in s.views[v].schema_key for v in s.alive)
    assert len(s.alive) == 2


def test_attribute_answer_no_prunes_views_with(session):
    s, _ = session
    q = s._question_attribute()
    s.answer(q, False)
    attr = q.payload
    assert all(attr not in s.views[v].schema_key for v in s.alive)


def test_skip_does_not_prune_but_counts_ask(session):
    s, _ = session
    q = s._question_attribute()
    inter = s.answer(q, None)
    assert not inter.answered
    assert inter.pruned == 0
    assert len(s.alive) == 4
    assert s.asked["attribute"] == 1
    assert s.answered["attribute"] == 0


def test_dataset_confirm_selects(session):
    s, _ = session
    q = s._question_dataset()
    s.answer(q, True)
    assert s.selected == q.payload
    assert s.alive == {q.payload}


def test_dataset_reject_prunes_one(session):
    s, _ = session
    q = s._question_dataset()
    s.answer(q, False)
    assert q.payload not in s.alive
    assert len(s.alive) == 3


def test_dataset_interface_does_not_repeat_views(session):
    s, _ = session
    q1 = s._question_dataset()
    s.answer(q1, False)
    q2 = s._question_dataset()
    assert q2.payload != q1.payload


def test_summary_question_and_prune(session):
    s, _ = session
    q = s._question_summary()
    assert q is not None
    schema, block = q.payload
    s.answer(q, False)
    assert not (set(block) & s.alive)


def test_summary_focus_on_relevant_block(session):
    s, _ = session
    q = s._question_summary()
    _, block = q.payload
    s.answer(q, True)
    assert s.alive == set(block)


def test_r_estimate_laplace(session):
    s, _ = session
    assert s.r("attribute") == pytest.approx(0.5)
    q = s._question_attribute()
    s.answer(q, True)
    assert s.r("attribute") == pytest.approx(2 / 3)
    q2 = s._question_attribute()
    if q2:
        s.answer(q2, None)
        assert s.r("attribute") == pytest.approx(2 / 4)


def test_next_question_bootstrap_covers_interfaces(session):
    s, _ = session
    seen = set()
    for _ in range(8):
        q = s.next_question()
        if q is None:
            break
        seen.add(q.interface)
        s.answer(q, None)  # skip everything; alive set unchanged
    assert len(seen) >= 3


def test_next_question_none_when_exhausted(spark):
    views = [_mv(0, pd.DataFrame({"k": ["1"], "v": ["a"]}))]
    dist = distill(spark, views)
    s = PresentationSession(views, dist, seed=1)
    # Only the dataset interface has a question for a single view.
    for _ in range(4):
        q = s.next_question()
        if q is None:
            break
        s.answer(q, None)
    assert s.next_question() is None


def test_scores_move_with_answers(session):
    s, _ = session
    q = s._question_attribute()
    s.answer(q, True)
    kept = s.rank()
    assert all(s.scores[v] > 0 for v in kept)
    pruned = set(s.views) - s.alive
    assert all(s.scores[v] < 0 for v in pruned)


def test_rank_orders_by_score(session):
    s, _ = session
    s.scores[0] = 5.0
    s.scores[1] = 1.0
    ranked = s.rank()
    assert ranked.index(0) < ranked.index(1)


def test_gamma_one_is_pure_exploration(spark):
    views = [
        _mv(0, pd.DataFrame({"k": ["1"], "v": ["a"]})),
        _mv(1, pd.DataFrame({"k": ["2"], "v": ["b"]})),
        _mv(2, pd.DataFrame({"x": ["1"], "y": ["a"]})),
    ]
    dist = distill(spark, views)
    s = PresentationSession(views, dist, gamma=1.0, seed=3)
    counts = {i: 0 for i in INTERFACES}
    for _ in range(30):
        q = s.next_question()
        if q is None:
            break
        counts[q.interface] += 1
        s.answer(q, None)
    assert sum(counts.values()) > 0
