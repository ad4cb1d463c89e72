"""The relational operator DAG that Conclave compiles (§4, §5).

Nodes carry the results of the analysis passes:

* ``owner`` — the party that can derive the relation locally, or None
  for a partitioned/combined relation (§5.1 pass 1);
* ``trust`` — per-column trust sets (§5.1 pass 2);
* ``site`` — where the compiled plan executes the node:
  ``("clear", party)``, ``("mpc",)``, ``("hybrid", stp)`` or
  ``("public", party)``;
* ``sorted_by`` / ``input_sorted`` — sort-order tracking for the §5.4
  sort-elimination optimization.

Rewrites (§5.2, §5.3) replace nodes; the physical plan is simply the
annotated DAG in topological order, interpreted by the runtime engine.
"""
from __future__ import annotations

import itertools
from dataclasses import dataclass, field

from .columns import Column, Party

_ids = itertools.count()

SUM = "sum"
COUNT = "count"


@dataclass(eq=False)
class Node:
    """Base operator node. ``parents`` are upstream nodes; ``out_cols``
    is the output schema (column names, all int-typed under MPC)."""

    parents: list["Node"]
    out_cols: list[str]
    name: str = ""
    # analysis annotations
    owner: str | None = None
    trust: dict[str, frozenset[str]] = field(default_factory=dict)
    site: tuple | None = None
    #: set by the §5.2 push-up pass to pin a node to clear execution at a
    #: recipient even though its owner differs
    forced_site: tuple | None = None
    sorted_by: str | None = None
    input_sorted: bool = False

    def __post_init__(self):
        if not self.name:
            self.name = f"{type(self).__name__.lower()}_{next(_ids)}"

    def op_name(self) -> str:
        return type(self).__name__


@dataclass(eq=False)
class Input(Node):
    """A party's input relation (``newTable``)."""

    party: Party = None  # type: ignore[assignment]
    schema: list[Column] = field(default_factory=list)


@dataclass(eq=False)
class Concat(Node):
    """Duplicate-preserving union of same-schema relations (possibly
    owned by different parties) — the paper's multi-party input builder."""


@dataclass(eq=False)
class Project(Node):
    cols: list[str] = field(default_factory=list)


@dataclass(eq=False)
class Filter(Node):
    col: str = ""
    op: str = "=="  # ==, !=, <, >, <=, >=
    value: int = 0


@dataclass(eq=False)
class Arith(Node):
    """out_col = left <op> right, appended to the schema. ``right`` is a
    column name or an int scalar; op in {*, /}. Division under MPC is
    fixed-point (engine tracks scales); in the clear it is float."""

    out_col: str = ""
    left: str = ""
    op: str = "*"
    right: str | int = 1


@dataclass(eq=False)
class Aggregate(Node):
    """Grouped or scalar SUM/COUNT. Output schema: group_cols + [out_col]."""

    group_cols: list[str] = field(default_factory=list)
    agg_op: str = SUM
    over: str | None = None
    out_col: str = ""
    # set by the §5.2 aggregation-split rewrite on the MPC-side combiner
    secondary: bool = False
    # set by the §5.2 push-up leaf-count rewrite: run the count in the
    # clear at the recipient over an MPC projection of the group column
    clear_count_at: str | None = None


@dataclass(eq=False)
class Join(Node):
    """Inner equi-join on single key columns; output key column keeps the
    left name. Empty keys = cross join (used for scalar broadcast)."""

    left_key: str = ""
    right_key: str = ""


@dataclass(eq=False)
class HybridJoin(Node):
    """§5.3 hybrid join: key columns revealed to the STP, who joins in
    the clear; rows reconstructed under MPC via oblivious indexing."""

    left_key: str = ""
    right_key: str = ""
    stp: str = ""


@dataclass(eq=False)
class PublicJoin(Node):
    """§5.3 public join: key columns public, join computed in the clear
    at a chosen party; only matching rows re-enter MPC."""

    left_key: str = ""
    right_key: str = ""
    at: str = ""


@dataclass(eq=False)
class HybridAggregate(Node):
    """§5.3 hybrid aggregation: shuffled group-by column revealed to the
    STP, which sorts in the clear; accumulation stays under MPC."""

    group_cols: list[str] = field(default_factory=list)
    agg_op: str = SUM
    over: str | None = None
    out_col: str = ""
    stp: str = ""


@dataclass(eq=False)
class DistinctCount(Node):
    col: str = ""
    out_col: str = "distinct_count"


@dataclass(eq=False)
class SortBy(Node):
    col: str = ""
    ascending: bool = True


@dataclass(eq=False)
class Limit(Node):
    n: int = 10


@dataclass(eq=False)
class Output(Node):
    """writeToCSV(to=...): reveal the result to the recipient parties."""

    recipients: list[Party] = field(default_factory=list)


class Dag:
    """A query DAG: the output nodes plus traversal helpers."""

    def __init__(self, outputs: list[Output]):
        self.outputs = outputs

    def topo_order(self) -> list[Node]:
        seen: dict[int, Node] = {}
        order: list[Node] = []

        def visit(n: Node):
            if id(n) in seen:
                return
            seen[id(n)] = n
            for p in n.parents:
                visit(p)
            order.append(n)

        for o in self.outputs:
            visit(o)
        return order

    def consumers(self) -> dict[int, list[Node]]:
        cons: dict[int, list[Node]] = {}
        for n in self.topo_order():
            for p in n.parents:
                cons.setdefault(id(p), []).append(n)
        return cons

    def replace_node(self, old: Node, new: Node) -> None:
        """Point every consumer of ``old`` (and the output list) at ``new``."""
        for n in self.topo_order():
            n.parents = [new if p is old else p for p in n.parents]
        self.outputs = [new if o is old else o for o in self.outputs]  # type: ignore[misc]

    def nodes_of_type(self, cls) -> list[Node]:
        return [n for n in self.topo_order() if isinstance(n, cls)]
