"""VIEW-PRESENTATION (paper Section IV, Algorithm 2).

A multi-arm bandit chooses among four *question interfaces* (arms):
attribute, dataset, dataset-pair (4C-aware), and summary. Pulling an arm
asks the user the interface's current highest-gain question; the reward
is the reduction of the candidate set. Following the paper, arm choice
uses the Exp3-style distribution

    p(I) = (1-γ) · w(I)/Σw  + γ/|I| ,   w(I) = r(I)·χ(I)

where r(I) is the estimated probability the user answers a question on
interface I and χ(I) the question's information gain. The approach is
bootstrapped with pure exploration until O(log|I|) questions per
interface have been asked.

**Info-gain note (documented deviation).** The paper defines gain as the
maximum number of irrelevant views pruned if the question is answered;
taken literally this is maximized by degenerate all-or-nothing questions
(an attribute present in every view "prunes n" on a No). We use the
minimax gain — the pruning guaranteed under the worse answer — which
keeps question selection balanced; the bandit reward stays the *actual*
observed reduction, as in the paper.
"""
from __future__ import annotations

import math
import random
from dataclasses import dataclass, field

from repro.core.distillation import DistillationResult
from repro.core.materializer import MaterializedView

INTERFACES = ("attribute", "dataset", "dataset_pair", "summary")


@dataclass
class Question:
    interface: str
    payload: object
    gain: int


@dataclass
class Interaction:
    question: Question
    answered: bool
    pruned: int


@dataclass
class SessionResult:
    found: bool
    n_interactions: int
    remaining: list[int]
    history: list[Interaction] = field(default_factory=list)
    ranking: list[int] = field(default_factory=list)


def _token_distance(a: str, b: str) -> float:
    """Token-level Jaccard distance — stand-in for the paper's word2vec
    distance (no pretrained embeddings offline; DESIGN.md §5)."""
    ta = set(a.lower().replace("_", " ").replace("-", " ").split())
    tb = set(b.lower().replace("_", " ").replace("-", " ").split())
    if not ta or not tb:
        return 1.0
    return 1.0 - len(ta & tb) / len(ta | tb)


class PresentationSession:
    """One interactive session over a candidate view set.

    ``views`` are the distilled candidates; ``distillation`` provides 4C
    edges for the dataset-pair interface. The caller drives the loop by
    alternating :meth:`next_question` and :meth:`answer` — the simulated
    user study and any real frontend share this surface.
    """

    def __init__(self, views: list[MaterializedView],
                 distillation: DistillationResult,
                 query_text: str = "",
                 gamma: float = 0.2, seed: int = 0,
                 prioritization: str = "query_distance"):
        self.views = {v.view_id: v for v in views}
        self.alive: set[int] = set(self.views)
        self.dist = distillation
        self.query_text = query_text
        self.gamma = gamma
        self.rng = random.Random(seed)
        self.prioritization = prioritization
        self.asked: dict[str, int] = {i: 0 for i in INTERFACES}
        self.answered: dict[str, int] = {i: 0 for i in INTERFACES}
        self.history: list[Interaction] = []
        self._asked_attrs: set[str] = set()
        self._shown_views: set[int] = set()
        self._asked_pairs: set[frozenset[int]] = set()
        self._asked_blocks: set[tuple[str, ...]] = set()
        self.scores: dict[int, float] = {v: 0.0 for v in self.views}
        self.selected: int | None = None
        # O(log|I|) bootstrap questions per interface (Section IV-A); the
        # constant is 1/2 so a 4-interface session explores each arm once
        # before switching to the bandit (keeps the paper's ~3-interaction
        # median reachable).
        self._bootstrap_quota = max(1, math.ceil(math.log2(len(INTERFACES)) / 2))

    # ---- r(I): answer-likelihood estimate (Laplace-smoothed) -------------
    def r(self, interface: str) -> float:
        return (self.answered[interface] + 1) / (self.asked[interface] + 2)

    # ---- candidate questions per interface -------------------------------
    def _attributes(self) -> dict[str, set[int]]:
        attrs: dict[str, set[int]] = {}
        for v in self.alive:
            for a in self.views[v].schema_key:
                attrs.setdefault(a, set()).add(v)
        return attrs

    def _question_attribute(self) -> Question | None:
        attrs = self._attributes()
        n = len(self.alive)
        best = None
        for a, withset in attrs.items():
            if a in self._asked_attrs:
                continue
            gain = min(len(withset), n - len(withset))
            if gain == 0:
                continue
            dist = _token_distance(a, self.query_text)
            cand = (gain, -dist, a)
            if best is None or cand > best:
                best = cand
        if best is None:
            return None
        return Question("attribute", best[2], best[0])

    def _question_dataset(self) -> Question | None:
        ranked = self.rank()
        for v in ranked:
            if v not in self._shown_views:
                return Question("dataset", v, 1)
        return None

    def _question_pair(self) -> Question | None:
        # Prefer the most discriminative unresolved contradiction, then any
        # other labelled 4C pair among alive views.
        for c in sorted(self.dist.contradictions,
                        key=lambda c: -c.discrimination):
            groups = [g & self.alive for g in c.groups]
            groups = [g for g in groups if g]
            if len(groups) < 2:
                continue
            if ("contradiction", c.key, c.value) in self._asked_pairs:
                continue
            gain = sum(len(g) for g in groups) - max(len(g) for g in groups)
            return Question("dataset_pair", ("contradiction", c), max(1, gain))
        for _key, pairs in self.dist.complementary_by_key.items():
            for p in pairs:
                if p <= self.alive and p not in self._asked_pairs:
                    return Question("dataset_pair", ("pair", tuple(sorted(p))), 1)
        return None

    def _question_summary(self) -> Question | None:
        n = len(self.alive)
        best = None
        for ids in self.dist.blocks:
            block = tuple(sorted(set(ids) & self.alive))
            if not block:
                continue
            schema = self.views[block[0]].schema_key
            if schema in self._asked_blocks:
                continue
            gain = min(len(block), n - len(block))
            if gain == 0:
                continue
            cand = (gain, schema, block)
            if best is None or cand > best:
                best = cand
        if best is None:
            return None
        return Question("summary", (best[1], best[2]), best[0])

    def _best_question(self, interface: str) -> Question | None:
        return {
            "attribute": self._question_attribute,
            "dataset": self._question_dataset,
            "dataset_pair": self._question_pair,
            "summary": self._question_summary,
        }[interface]()

    # ---- Algorithm 2 loop ------------------------------------------------
    def next_question(self) -> Question | None:
        """Choose an interface (bootstrap exploration, then the Exp3-style
        distribution) and return its best question."""
        options = {i: self._best_question(i) for i in INTERFACES}
        options = {i: q for i, q in options.items() if q is not None}
        if not options:
            return None
        under = [i for i in options if self.asked[i] < self._bootstrap_quota]
        if under:
            choice = self.rng.choice(sorted(under))
            return options[choice]
        weights = {i: self.r(i) * max(1, q.gain) for i, q in options.items()}
        total = sum(weights.values())
        names = sorted(options)
        probs = [
            (1 - self.gamma) * weights[i] / total + self.gamma / len(names)
            for i in names
        ]
        choice = self.rng.choices(names, weights=probs, k=1)[0]
        return options[choice]

    def answer(self, q: Question, response: object) -> Interaction:
        """Apply a user response. ``response`` is ``None`` for Skip;
        otherwise interface-specific (see the simulated user)."""
        self.asked[q.interface] += 1
        before = len(self.alive)
        self._mark_asked(q)
        if response is None:
            inter = Interaction(q, False, 0)
            self.history.append(inter)
            return inter
        self.answered[q.interface] += 1
        self._apply(q, response)
        inter = Interaction(q, True, before - len(self.alive))
        self.history.append(inter)
        return inter

    def _mark_asked(self, q: Question) -> None:
        if q.interface == "attribute":
            self._asked_attrs.add(q.payload)
        elif q.interface == "dataset":
            self._shown_views.add(q.payload)
        elif q.interface == "dataset_pair":
            kind, payload = q.payload
            if kind == "contradiction":
                self._asked_pairs.add(("contradiction", payload.key,
                                       payload.value))
            else:
                self._asked_pairs.add(frozenset(payload))
        elif q.interface == "summary":
            self._asked_blocks.add(q.payload[0])

    def _apply(self, q: Question, response: object) -> None:
        n_captured = 1
        if q.interface == "attribute":
            attr, want = q.payload, bool(response)
            hit = {v for v in self.alive
                   if (attr in self.views[v].schema_key) == want}
            n_captured = max(1, len(hit))
            self._score(hit, +1.0, q)
            self._score(self.alive - hit, -1.0, q)
            self.alive = hit or self.alive
        elif q.interface == "dataset":
            v = q.payload
            if response:  # the user confirms this is the desired view
                self.selected = v
                self.alive = {v}
            else:
                self.alive.discard(v)
                self._score({v}, -1.0, q)
        elif q.interface == "dataset_pair":
            kind, payload = q.payload
            if kind == "contradiction":
                c = payload
                groups = [g & self.alive for g in c.groups]
                groups = [g for g in groups if g]
                chosen = response  # index of the group the user agrees with
                keep = groups[chosen % len(groups)]
                for g in groups:
                    if g is not keep:
                        self.alive -= g
                self._score(keep, +1.0, q)
            else:
                a, b = payload
                keep = a if response == 0 else b
                drop = b if keep == a else a
                self.alive.discard(drop)
                self._score({keep}, +1.0, q)
                self._score({drop}, -1.0, q)
        elif q.interface == "summary":
            schema, block = q.payload
            block_set = set(block) & self.alive
            if response:  # the summarized group is relevant → focus on it
                self._score(block_set, +1.0, q)
                self.alive = block_set or self.alive
            else:
                self._score(block_set, -1.0, q)
                self.alive -= block_set

    def _score(self, views: set[int], s: float, q: Question) -> None:
        """Utility-score update (Section IV-B): s · P(D|Q✓) · P(Q✓) with
        P(D|Q✓) ∝ 1/#captured and P(Q✓) ≈ r(interface)."""
        if not views:
            return
        p_correct = self.r(q.interface)
        for v in views:
            self.scores[v] += s * (1.0 / len(views)) * p_correct

    def rank(self) -> list[int]:
        """Alive views by utility score (desc), then join-score order."""
        return sorted(self.alive, key=lambda v: (-self.scores[v], v))
