"""Simulated user population — stand-in for the paper's IRB user study.

The paper recruits 18 participants with diverse backgrounds; different
users can answer different question types (the motivation for the bandit
over interfaces). Each :class:`SimulatedUser` has

* per-interface answer probabilities (heterogeneous across the
  population — some recognize attributes, others need to see records);
* a recognition probability for spotting the ground-truth view when it
  is shown directly;
* an inspection budget for flat-ranking (FastTopK) scanning.

Users answer *correctly* when they answer (the paper's end-to-end
simulation makes the same assumption: "we simulated the user to answer
questions correctly"); not answering is a Skip.
"""
from __future__ import annotations

import random
from dataclasses import dataclass, field

from repro.core.fasttopk import rank_views
from repro.core.materializer import MaterializedView
from repro.core.presentation import (
    PresentationSession,
    Question,
    SessionResult,
)
from repro.core.qbe import ExampleQuery


@dataclass
class SimulatedUser:
    seed: int
    answer_prob: dict[str, float]
    recognition: float = 0.9
    budget: int = 25
    rng: random.Random = field(init=False)

    def __post_init__(self) -> None:
        self.rng = random.Random(self.seed)

    def engages(self, interface: str) -> bool:
        return self.rng.random() < self.answer_prob.get(interface, 0.5)

    def recognizes(self) -> bool:
        return self.rng.random() < self.recognition


def user_population(n: int = 18, seed: int = 42) -> list[SimulatedUser]:
    """A heterogeneous population: answer probabilities drawn per user
    and per interface, so each user favors different question types."""
    g = random.Random(seed)
    users = []
    for i in range(n):
        probs = {
            "attribute": 0.2 + 0.75 * g.random(),
            "dataset": 0.2 + 0.75 * g.random(),
            "dataset_pair": 0.2 + 0.75 * g.random(),
            "summary": 0.2 + 0.75 * g.random(),
        }
        users.append(SimulatedUser(seed=seed * 1000 + i, answer_prob=probs,
                                   recognition=0.85 + 0.1 * g.random(),
                                   budget=g.randint(15, 60)))
    return users


def _correct_answer(q: Question, session: PresentationSession,
                    gt_view: int, views: dict[int, MaterializedView]
                    ) -> object:
    """The ground-truth-consistent answer to a question."""
    gt_schema = set(views[gt_view].schema_key) if gt_view in views else set()
    if q.interface == "attribute":
        return q.payload in gt_schema
    if q.interface == "dataset":
        return q.payload == gt_view
    if q.interface == "dataset_pair":
        kind, payload = q.payload
        if kind == "contradiction":
            groups = [g & session.alive for g in payload.groups]
            groups = [g for g in groups if g]
            for i, g in enumerate(groups):
                if gt_view in g:
                    return i
            # gt not involved: agree with the majority side
            return max(range(len(groups)), key=lambda i: len(groups[i]))
        a, b = payload
        if gt_view == b:
            return 1
        return 0
    if q.interface == "summary":
        _schema, block = q.payload
        return gt_view in set(block)
    raise ValueError(q.interface)


def run_ver_session(views: list[MaterializedView], distillation,
                    user: SimulatedUser, gt_view: int,
                    query_text: str = "", max_iter: int = 30,
                    gamma: float = 0.2) -> SessionResult:
    """Drive Algorithm 2 with a simulated user until the view is found,
    the question budget is exhausted, or no questions remain."""
    session = PresentationSession(views, distillation, query_text=query_text,
                                  gamma=gamma, seed=user.seed)
    by_id = {v.view_id: v for v in views}
    found = False
    n = 0
    for _ in range(max_iter):
        q = session.next_question()
        if q is None:
            break
        n += 1
        if user.engages(q.interface):
            if q.interface == "dataset" and q.payload == gt_view:
                # Direct inspection: recognition can fail → Skip.
                if not user.recognizes():
                    session.answer(q, None)
                    continue
            resp = _correct_answer(q, session, gt_view, by_id)
            session.answer(q, resp)
        else:
            session.answer(q, None)
        if session.selected == gt_view:
            found = True
            break
        if gt_view in session.alive and len(session.alive) <= 3:
            # Short list: the user scans it directly and picks.
            if user.recognizes():
                found = True
                break
    return SessionResult(found=found, n_interactions=n,
                         remaining=sorted(session.alive),
                         history=session.history,
                         ranking=session.rank())


def run_fasttopk_session(views: list[MaterializedView], query: ExampleQuery,
                         user: SimulatedUser, gt_view: int) -> SessionResult:
    """The baseline: the user scans the overlap-ranked list top-down,
    inspecting at most ``budget`` views."""
    ranked = rank_views(views, query)
    inspected = 0
    found = False
    for v in ranked:
        if inspected >= user.budget:
            break
        inspected += 1
        if v.view_id == gt_view and user.recognizes():
            found = True
            break
    return SessionResult(found=found, n_interactions=inspected,
                         remaining=[v.view_id for v in ranked],
                         ranking=[v.view_id for v in ranked])
