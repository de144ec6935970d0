"""Hypothesis property tests for bag-state algebra (pure pandas, fast)."""
import pandas as pd
from hypothesis import given, settings
from hypothesis import strategies as hst

from repro.ivm import state as st

FIELDS = [("a", "long"), ("b", "string")]

row = hst.tuples(
    hst.integers(min_value=0, max_value=3),
    hst.sampled_from(["x", "y", None]),
    hst.integers(min_value=-3, max_value=3),
)


def to_pdf(rows):
    return pd.DataFrame([{"a": a, "b": b, st.MULT: m} for a, b, m in rows],
                        columns=["a", "b", st.MULT])


def canon(pdf):
    rows = [(int(r["a"]), r["b"], int(r[st.MULT])) for _, r in pdf.iterrows()]
    return sorted(rows, key=lambda t: (t[0], t[1] is not None, t[1] or "", t[2]))


@given(hst.lists(row, max_size=12))
@settings(max_examples=60, deadline=None)
def test_normalize_idempotent(rows):
    p = to_pdf(rows)
    once = st.normalize(p, FIELDS)
    twice = st.normalize(once, FIELDS)
    assert canon(once) == canon(twice)


@given(hst.lists(row, max_size=12))
@settings(max_examples=60, deadline=None)
def test_normalize_never_zero_mult(rows):
    out = st.normalize(to_pdf(rows), FIELDS)
    assert (out[st.MULT] != 0).all() if not out.empty else True


@given(hst.lists(row, max_size=10), hst.lists(row, max_size=10))
@settings(max_examples=60, deadline=None)
def test_add_then_subtract_roundtrips(srows, drows):
    s = st.normalize(to_pdf(srows), FIELDS)
    d = st.normalize(to_pdf(drows), FIELDS)
    back = st.add(st.add(s, d, FIELDS), st.negate(d), FIELDS)
    assert canon(back) == canon(s)


@given(hst.lists(row, max_size=10), hst.lists(row, max_size=10))
@settings(max_examples=60, deadline=None)
def test_add_commutative(a_rows, b_rows):
    a = st.normalize(to_pdf(a_rows), FIELDS)
    b = st.normalize(to_pdf(b_rows), FIELDS)
    ab = st.add(a, b, FIELDS)
    ba = st.add(b, a, FIELDS)
    assert canon(ab) == canon(ba)


@given(hst.lists(row, max_size=12))
@settings(max_examples=60, deadline=None)
def test_total_multiplicity_preserved(rows):
    p = to_pdf(rows)
    assert (p[st.MULT].sum() if not p.empty else 0) == (
        st.normalize(p, FIELDS)[st.MULT].sum() if not st.normalize(p, FIELDS).empty else 0
    )
