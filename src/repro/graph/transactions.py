"""Fine-grained property graph update operations (FGN).

The paper's FGN property requires *fine granularity update operations on
nested data structures*: updating one property of one vertex must be
expressible (and must later propagate as a small delta, not a whole-vertex
re-derivation). The update vocabulary here is therefore:

* ``AddVertex`` / ``DeleteVertex`` (delete cascades to incident edges),
* ``AddEdge`` / ``DeleteEdge``,
* ``SetProperty`` / ``RemoveProperty`` on a single key of a single
  vertex/edge — the FGN primitives.

A :class:`Transaction` is an ordered batch of operations applied atomically;
the engine derives one :class:`GraphDelta` per transaction. At the α/β
(nested-relation) level a property update is represented as *retract old
row + assert new row*; fine granularity is realised downstream, where leaf
scans only react to the properties they actually read (DESIGN.md T5).
"""
from __future__ import annotations

from dataclasses import dataclass, field
from typing import Literal, Mapping, Optional, Sequence, Union


@dataclass(frozen=True)
class AddVertex:
    """Insert a new vertex. ``id`` must be fresh."""

    id: int
    label: str
    properties: Mapping[str, str] = field(default_factory=dict)


@dataclass(frozen=True)
class DeleteVertex:
    """Delete a vertex; incident edges are deleted in the same transaction."""

    id: int


@dataclass(frozen=True)
class AddEdge:
    """Insert a new edge between two existing vertices. ``id`` must be fresh."""

    id: int
    src: int
    dst: int
    type: str
    properties: Mapping[str, str] = field(default_factory=dict)


@dataclass(frozen=True)
class DeleteEdge:
    """Delete an edge by id."""

    id: int


@dataclass(frozen=True)
class SetProperty:
    """Set one property key on one vertex or edge (FGN primitive)."""

    kind: Literal["vertex", "edge"]
    id: int
    key: str
    value: str


@dataclass(frozen=True)
class RemoveProperty:
    """Remove one property key from one vertex or edge (FGN primitive)."""

    kind: Literal["vertex", "edge"]
    id: int
    key: str


Operation = Union[AddVertex, DeleteVertex, AddEdge, DeleteEdge, SetProperty, RemoveProperty]


@dataclass(frozen=True)
class Transaction:
    """An ordered batch of operations applied atomically."""

    ops: Sequence[Operation]

    def __iter__(self):
        return iter(self.ops)

    def __len__(self) -> int:
        return len(self.ops)


@dataclass
class GraphDelta:
    """Net effect of one transaction on the α/β relations.

    Each entry is a full row dict (``id``/``label``/``properties`` for
    vertices, ``id``/``src``/``dst``/``type``/``properties`` for edges).
    Deletes carry the row as it was *before* the transaction so downstream
    operators can retract exactly the tuples they derived from it. A row
    that is both deleted and (re-)inserted within one transaction appears in
    both lists only if its content changed; rows whose final state equals
    the initial state are dropped (the delta is *net*).
    """

    v_inserts: list = field(default_factory=list)
    v_deletes: list = field(default_factory=list)
    e_inserts: list = field(default_factory=list)
    e_deletes: list = field(default_factory=list)

    def is_empty(self) -> bool:
        return not (self.v_inserts or self.v_deletes or self.e_inserts or self.e_deletes)

    def size(self) -> int:
        """Total number of changed α/β rows (delta magnitude |Δ|)."""
        return (
            len(self.v_inserts)
            + len(self.v_deletes)
            + len(self.e_inserts)
            + len(self.e_deletes)
        )


def single(op: Operation) -> Transaction:
    """Wrap one operation in a transaction."""
    return Transaction(ops=(op,))
