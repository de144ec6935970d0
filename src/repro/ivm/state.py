"""Materialized-state bookkeeping for the IVM dataflow network.

Every dataflow node materializes its output as a *bag with multiplicities*:
a pandas DataFrame on the driver with the node's physical columns plus a
signed ``__mult`` (net multiplicity; state invariant: strictly positive,
deltas may be negative). All *relational* delta computation (joins,
filters, fixpoints) runs through Spark SQL — these helpers only lift
driver-side state/deltas into Spark DataFrames and collect results back
(DESIGN.md §2, "IVM state placement").

Columns are typed by explicit *fields*: ordered ``(name, tag)`` pairs with
tag ∈ {'long', 'string', 'array', 'map'} (see
``repro.fra.eval_spark.physical_fields`` — projection aliases are
user-chosen, so types cannot be inferred from names). Driver-side
canonical cell representations are hashable: tuples for arrays, sorted
pair-tuples for maps.
"""
from __future__ import annotations

from typing import Iterable, List, Sequence, Tuple

import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql.types import (
    ArrayType,
    LongType,
    MapType,
    StringType,
    StructField,
    StructType,
)

MULT = "__mult"

Fields = Sequence[Tuple[str, str]]

_SPARK_TYPES = {
    "long": LongType(),
    "string": StringType(),
    "array": ArrayType(LongType(), containsNull=False),
    "map": MapType(StringType(), StringType()),
}


def names(fields: Fields) -> List[str]:
    return [c for c, _t in fields]


def spark_schema_for(fields: Fields) -> StructType:
    """StructType for physical fields + ``__mult``."""
    out = [StructField(c, _SPARK_TYPES[t], nullable=True) for c, t in fields]
    out.append(StructField(MULT, LongType(), nullable=False))
    return StructType(out)


def empty_state(fields: Fields) -> pd.DataFrame:
    return pd.DataFrame(
        {**{c: pd.Series(dtype=object) for c in names(fields)}, MULT: pd.Series(dtype="int64")}
    )


def _canon_cell(tag: str, v):
    """Canonical driver-side representation (hashable)."""
    if v is None:
        return None
    if tag == "array":
        return tuple(int(x) for x in v)
    if tag == "map":
        items = v.items() if isinstance(v, dict) else v
        return tuple(sorted((str(k), str(val)) for k, val in items))
    return v


def _lift_cell(tag: str, v):
    if v is None:
        return None
    if tag == "array":
        return list(v)
    if tag == "map":
        return dict(v)
    return v


def normalize(pdf: pd.DataFrame, fields: Fields) -> pd.DataFrame:
    """Net out multiplicities: group by all value columns, drop zeros."""
    cols = names(fields)
    if pdf.empty:
        return empty_state(fields)
    pdf = pdf[cols + [MULT]]
    if cols:
        out = pdf.groupby(cols, dropna=False, sort=False, as_index=False)[MULT].sum()
    else:  # zero-column relation (not expected, defensive)
        out = pd.DataFrame({MULT: [pdf[MULT].sum()]})
    out = out[out[MULT] != 0].reset_index(drop=True)
    # groupby(dropna=False) represents None keys as NaN; restore None so
    # equality with freshly collected deltas holds.
    for c, t in fields:
        if t != "long":
            out[c] = out[c].astype(object).where(out[c].notna(), None)
    return out


def add(state: pd.DataFrame, delta: pd.DataFrame, fields: Fields) -> pd.DataFrame:
    """state ⊎ delta under bag semantics."""
    if delta.empty:
        return state
    if state.empty:
        return normalize(delta, fields)
    return normalize(pd.concat([state, delta], ignore_index=True), fields)


def negate(delta: pd.DataFrame) -> pd.DataFrame:
    if delta.empty:
        return delta
    out = delta.copy()
    out[MULT] = -out[MULT]
    return out


def lift(spark: SparkSession, pdf: pd.DataFrame, fields: Fields) -> DataFrame:
    """Driver state/delta → Spark DataFrame."""
    schema = spark_schema_for(fields)
    if pdf.empty:
        return spark.createDataFrame([], schema)
    rows = [
        tuple(_lift_cell(t, row[c]) for c, t in fields) + (int(row[MULT]),)
        for row in pdf.to_dict("records")
    ]
    return spark.createDataFrame(rows, schema)


def collect(sdf: DataFrame, fields: Fields) -> pd.DataFrame:
    """Spark delta → canonical driver representation (NOT normalized)."""
    pdf = sdf.toPandas()
    if pdf.empty:
        return empty_state(fields)
    out = pd.DataFrame()
    for c, t in fields:
        if t == "long":
            out[c] = pdf[c].astype("int64")
        elif t in ("array", "map"):
            out[c] = [_canon_cell(t, v) for v in pdf[c]]
        else:
            out[c] = pdf[c].astype(object).where(pdf[c].notna(), None)
    out[MULT] = pdf[MULT].astype("int64")
    return out


def expand_bag(state: pd.DataFrame, fields: Fields) -> pd.DataFrame:
    """Expand multiplicities back to duplicated rows (for reading results)."""
    cols = names(fields)
    if state.empty:
        return pd.DataFrame({c: pd.Series(dtype=object) for c in cols})
    assert (state[MULT] > 0).all(), "state has non-positive multiplicities"
    idx = state.index.repeat(state[MULT])
    return state.loc[idx, cols].reset_index(drop=True)
