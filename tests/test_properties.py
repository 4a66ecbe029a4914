"""Property-based tests (hypothesis) for the pure-Python kernels."""
import string

from hypothesis import given, settings
from hypothesis import strategies as st

from repro.corpus.collection import normalize_value
from repro.discovery.graph import union_find_components
from repro.discovery.index import _levenshtein_at_most

short_text = st.text(alphabet=string.ascii_lowercase, max_size=6)


@given(short_text, short_text)
@settings(max_examples=60, deadline=None)
def test_levenshtein_symmetric(a, b):
    for d in (0, 1, 2):
        assert _levenshtein_at_most(a, b, d) == _levenshtein_at_most(b, a, d)


@given(short_text)
@settings(max_examples=40, deadline=None)
def test_levenshtein_identity(a):
    assert _levenshtein_at_most(a, a, 0)


@given(short_text, short_text)
@settings(max_examples=60, deadline=None)
def test_levenshtein_monotone_in_distance(a, b):
    # if within d, then within d+1
    for d in (0, 1, 2):
        if _levenshtein_at_most(a, b, d):
            assert _levenshtein_at_most(a, b, d + 1)


@st.composite
def graphs(draw):
    n = draw(st.integers(min_value=1, max_value=12))
    nodes = list(range(n))
    edges = draw(st.lists(
        st.tuples(st.integers(0, n - 1), st.integers(0, n - 1)),
        max_size=20))
    return nodes, edges


@given(graphs())
@settings(max_examples=80, deadline=None)
def test_union_find_is_partition(g):
    nodes, edges = g
    comps = union_find_components(nodes, edges)
    flat = [x for c in comps for x in c]
    assert sorted(flat) == sorted(nodes)          # cover exactly once
    for a, b in edges:
        ca = next(c for c in comps if a in c)
        assert b in ca                             # edges never split


@given(graphs())
@settings(max_examples=40, deadline=None)
def test_union_find_edge_order_irrelevant(g):
    nodes, edges = g
    a = union_find_components(nodes, edges)
    b = union_find_components(nodes, list(reversed(edges)))
    assert sorted(map(sorted, a)) == sorted(map(sorted, b))


@given(st.one_of(
    st.none(),
    st.integers(min_value=-10**9, max_value=10**9),
    st.floats(allow_nan=True, allow_infinity=False, width=32),
    st.text(max_size=12),
    st.booleans(),
))
@settings(max_examples=100, deadline=None)
def test_normalize_value_idempotent(v):
    once = normalize_value(v)
    assert once is None or isinstance(once, str)
    if once is not None:
        assert normalize_value(once) == once


@given(st.integers(min_value=-10**6, max_value=10**6))
@settings(max_examples=50, deadline=None)
def test_normalize_int_float_agree(i):
    assert normalize_value(i) == normalize_value(float(i))
