"""Canonical schemas for the nested relations α (vertices) and β (edges).

The paper (§2) stores a property graph as two nested relations:

* α — vertices: ``(id, label, properties)`` where ``properties`` is a nested
  key/value relation.
* β — edges: ``(id, s, t, type, properties)``.

We realise the nested ``properties`` relation as a Spark
``map<string,string>`` column. All property values are stored as strings;
comparisons are typed at query time by the literal they compare against
(see ``repro.algebra`` expression compilation). This matches the paper's
schema-free setting: no property is declared up front, and the *minimal
schema* actually needed is inferred per query (DESIGN.md §1 step 3).
"""
from __future__ import annotations

from pyspark.sql.types import (
    LongType,
    MapType,
    StringType,
    StructField,
    StructType,
)

#: Spark schema of the vertex relation α.
VERTEX_SCHEMA = StructType(
    [
        StructField("id", LongType(), nullable=False),
        StructField("label", StringType(), nullable=False),
        StructField("properties", MapType(StringType(), StringType()), nullable=True),
    ]
)

#: Spark schema of the edge relation β. ``src``/``dst`` mirror the paper's
#: ``st : E → V × V`` source/target assignment.
EDGE_SCHEMA = StructType(
    [
        StructField("id", LongType(), nullable=False),
        StructField("src", LongType(), nullable=False),
        StructField("dst", LongType(), nullable=False),
        StructField("type", StringType(), nullable=False),
        StructField("properties", MapType(StringType(), StringType()), nullable=True),
    ]
)

#: Column order used when round-tripping through pandas.
VERTEX_COLUMNS = [f.name for f in VERTEX_SCHEMA.fields]
EDGE_COLUMNS = [f.name for f in EDGE_SCHEMA.fields]
