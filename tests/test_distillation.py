"""VIEW-DISTILLATION — 4C categorization and distillation strategies
(Algorithm 3, Definitions 5–9) on hand-crafted view sets."""
import pandas as pd
import pytest

from repro.core.distillation import (
    Contradiction,
    DistillationResult,
    contradiction_pruning_steps,
    distill,
)
from tests.test_hashing import _mv


def _pair(a, b):
    return frozenset({a, b})


@pytest.fixture(scope="module")
def crafted(spark):
    """0 ≡ 1 (compatible); 2 ⊂ 0 (contained); 3/4 complementary under key
    k; 5 contradicts 0/1 (same key value '1', different v); 6 is another
    schema block; 7 has no candidate key."""
    views = [
        _mv(0, pd.DataFrame({"k": ["1", "2", "3"], "v": ["a", "b", "c"]})),
        _mv(1, pd.DataFrame({"k": ["3", "2", "1"], "v": ["c", "b", "a"]})),
        _mv(2, pd.DataFrame({"k": ["1", "2"], "v": ["a", "b"]})),
        _mv(3, pd.DataFrame({"k": ["4", "5"], "v": ["d", "e"]})),
        _mv(4, pd.DataFrame({"k": ["5", "6"], "v": ["e", "f"]})),
        _mv(5, pd.DataFrame({"k": ["1", "7"], "v": ["X", "g"]})),
        _mv(6, pd.DataFrame({"z": ["zz"], "w": ["ww"]})),
    ]
    views.append(_mv(7, pd.DataFrame({"k": ["8", "8"], "v": ["h", "h"]})))
    return distill(spark, views, key_threshold=1.0)


def test_original_count(crafted):
    assert crafted.n_original == 8


def test_blocks_by_schema(crafted):
    sizes = sorted(len(b) for b in crafted.blocks)
    assert sizes == [1, 7]


def test_compatible_detected(crafted):
    assert _pair(0, 1) in crafted.compatible_pairs


def test_contained_detected_with_larger_kept(crafted):
    assert crafted.contained_pairs.get(_pair(0, 2)) == 0
    assert crafted.contained_pairs.get(_pair(1, 2)) == 1


def test_c1_dedupes_compatible(crafted):
    # 8 views, one compatible pair -> 7 after C1; representative is min id.
    assert crafted.after_c1 == 7
    assert crafted.representatives[1] == 0
    assert 1 not in crafted.survivors_c1


def test_c2_prunes_contained(crafted):
    assert 2 not in crafted.survivors_c2
    assert 0 in crafted.survivors_c2
    assert crafted.after_c2 == 6


def test_complementary_under_key(crafted):
    assert _pair(3, 4) in crafted.complementary_by_key.get("k", set())


def test_contradictory_detected(crafted):
    contr = crafted.contradictory_by_key.get("k", set())
    assert _pair(0, 5) in contr
    assert _pair(1, 5) in contr
    assert _pair(3, 4) not in contr


def test_contradiction_groups(crafted):
    (c,) = [c for c in crafted.contradictions if c.value == "1"]
    assert c.key == "k"
    groups = sorted(sorted(g) for g in c.groups)
    assert groups == [[0, 1, 2], [5]]
    assert c.discrimination == 3
    assert c.views == frozenset({0, 1, 2, 5})


def test_keyless_view_has_no_keys(crafted):
    assert crafted.keys[7] == []


def test_c3_counts_union_complementary(crafted):
    # 6 C2-survivors; 3-4 union under key k -> 5 in best case. Worst
    # case equals best here (single key choice).
    assert crafted.c3_best == 5
    assert crafted.c3_worst == 5


def test_edge_labels(crafted):
    assert crafted.edge_label(0, 1) == "compatible"
    assert crafted.edge_label(0, 2) == "contained"
    assert crafted.edge_label(3, 4) == "complementary"
    assert crafted.edge_label(0, 5) == "contradictory"
    assert crafted.edge_label(0, 6) is None


def test_reduction_ratio(crafted):
    assert crafted.reduction_ratio() == pytest.approx(1 - 6 / 8)


def test_pruning_steps(crafted):
    worst, best = contradiction_pruning_steps(crafted)
    # One contradiction among survivors {0,5}: best prunes the larger
    # side? groups among alive: {0},{5} -> keep min -> prune 1 view.
    assert worst and best
    assert worst[0] == crafted.after_c2 - 1
    assert best[0] == crafted.after_c2 - 1


def test_empty_input(spark):
    res = distill(spark, [])
    assert res.n_original == 0
    assert res.after_c1 == 0
    assert res.c3_best == 0
    assert res.reduction_ratio() == 0.0


def test_transitive_compatibility(spark):
    views = [
        _mv(0, pd.DataFrame({"k": ["1"], "v": ["a"]})),
        _mv(1, pd.DataFrame({"k": ["1"], "v": ["a"]})),
        _mv(2, pd.DataFrame({"k": ["1"], "v": ["a"]})),
    ]
    res = distill(spark, views)
    assert res.after_c1 == 1
    assert res.representatives == {0: 0, 1: 0, 2: 0}


def test_containment_chain_keeps_largest(spark):
    views = [
        _mv(0, pd.DataFrame({"k": ["1"], "v": ["a"]})),
        _mv(1, pd.DataFrame({"k": ["1", "2"], "v": ["a", "b"]})),
        _mv(2, pd.DataFrame({"k": ["1", "2", "3"], "v": ["a", "b", "c"]})),
    ]
    res = distill(spark, views)
    assert res.survivors_c2 == [2]


def test_contradiction_dataclass():
    c = Contradiction("k", "x", [frozenset({1, 2}), frozenset({3})])
    assert c.discrimination == 2
    assert c.views == frozenset({1, 2, 3})


def test_result_defaults():
    r = DistillationResult(n_original=0, blocks=[])
    assert r.after_c1 == 0 and r.after_c2 == 0
