"""Driver-state helpers: normalize/add/lift/collect round-trips."""
import pandas as pd
import pytest

from repro.ivm import state as st

F_SIMPLE = [("a", "long"), ("b", "string")]
F_PATH = [("a", "long"), ("t__vs", "array"), ("t__es", "array")]
F_MAP = [("a", "long"), ("a__props", "map")]


def mk(fields, rows):
    cols = st.names(fields)
    return pd.DataFrame([dict(zip(cols + [st.MULT], r)) for r in rows], columns=cols + [st.MULT])


def test_empty_state():
    s = st.empty_state(F_SIMPLE)
    assert s.empty and list(s.columns) == ["a", "b", st.MULT]


def test_normalize_merges_duplicates():
    out = st.normalize(mk(F_SIMPLE, [(1, "x", 1), (1, "x", 2), (2, "y", 1)]), F_SIMPLE)
    assert sorted(out.itertuples(index=False)) == [(1, "x", 3), (2, "y", 1)]


def test_normalize_drops_zero():
    out = st.normalize(mk(F_SIMPLE, [(1, "x", 1), (1, "x", -1)]), F_SIMPLE)
    assert out.empty


def test_normalize_keeps_none_keys():
    out = st.normalize(mk(F_SIMPLE, [(1, None, 1), (1, None, 1)]), F_SIMPLE)
    assert len(out) == 1 and out.iloc[0][st.MULT] == 2
    assert out.iloc[0]["b"] is None


def test_normalize_tuple_keys():
    rows = [(1, (1, 2), (10,), 1), (1, (1, 2), (10,), 1), (1, (1, 3), (11,), 1)]
    out = st.normalize(mk(F_PATH, rows), F_PATH)
    assert len(out) == 2
    assert out.set_index("t__es").loc[[(10,)]][st.MULT].iloc[0] == 2


def test_add_cancels():
    s = st.normalize(mk(F_SIMPLE, [(1, "x", 2)]), F_SIMPLE)
    d = mk(F_SIMPLE, [(1, "x", -2), (3, "z", 1)])
    out = st.add(s, d, F_SIMPLE)
    assert sorted(out.itertuples(index=False)) == [(3, "z", 1)]


def test_negate():
    d = mk(F_SIMPLE, [(1, "x", 2), (2, "y", -1)])
    n = st.negate(d)
    assert list(n[st.MULT]) == [-2, 1]


def test_lift_collect_roundtrip_simple(spark):
    pdf = st.normalize(mk(F_SIMPLE, [(1, "x", 1), (2, None, 3)]), F_SIMPLE)
    back = st.collect(st.lift(spark, pdf, F_SIMPLE), F_SIMPLE)
    assert_frames(st.normalize(back, F_SIMPLE), pdf)


def test_lift_collect_roundtrip_paths(spark):
    pdf = st.normalize(mk(F_PATH, [(1, (1, 2, 3), (10, 11), 1), (2, (2,), (), 2)]), F_PATH)
    back = st.normalize(st.collect(st.lift(spark, pdf, F_PATH), F_PATH), F_PATH)
    assert_frames(back, pdf)
    assert isinstance(back["t__vs"].iloc[0], tuple)


def test_lift_collect_roundtrip_maps(spark):
    pdf = st.normalize(
        mk(F_MAP, [(1, (("k", "v"), ("l", "w")), 1), (2, None, 1)]), F_MAP
    )
    back = st.normalize(st.collect(st.lift(spark, pdf, F_MAP), F_MAP), F_MAP)
    assert_frames(back, pdf)


def test_lift_empty(spark):
    df = st.lift(spark, st.empty_state(F_PATH), F_PATH)
    assert df.count() == 0
    assert [f.name for f in df.schema.fields] == ["a", "t__vs", "t__es", st.MULT]


def test_expand_bag():
    s = st.normalize(mk(F_SIMPLE, [(1, "x", 3), (2, "y", 1)]), F_SIMPLE)
    bag = st.expand_bag(s, F_SIMPLE)
    assert sorted(bag["a"]) == [1, 1, 1, 2]


def test_expand_bag_rejects_negative():
    s = mk(F_SIMPLE, [(1, "x", -1)])
    with pytest.raises(AssertionError):
        st.expand_bag(s, F_SIMPLE)


def assert_frames(a: pd.DataFrame, b: pd.DataFrame) -> None:
    a = a.sort_values(st.names([(c, "") for c in a.columns if c != st.MULT]) or list(a.columns)).reset_index(drop=True)
    b = b.sort_values(list(b.columns[:-1]) or list(b.columns)).reset_index(drop=True)
    pd.testing.assert_frame_equal(a.astype(object), b.astype(object), check_dtype=False)
