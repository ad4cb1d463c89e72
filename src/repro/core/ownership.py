"""§5.1 pass 1: relation-ownership propagation.

A party *owns* a relation if it can derive it from its own data alone.
Inputs are owned by their storing party; unary operators inherit their
parent's owner; multi-input operators propagate a common owner or None.
Nodes whose output relation lacks an owner must run under MPC (§5.1).
"""
from __future__ import annotations

from . import dag as D


def propagate_ownership(dag: D.Dag) -> None:
    for n in dag.topo_order():
        if isinstance(n, D.Input):
            n.owner = n.party.name
        elif isinstance(n, D.Output):
            # an output is materialized at its recipients; ownership-wise
            # it inherits the parent (used only for all-clear plans)
            n.owner = n.parents[0].owner
        elif len(n.parents) == 1:
            n.owner = n.parents[0].owner
        else:
            owners = {p.owner for p in n.parents}
            n.owner = owners.pop() if len(owners) == 1 and None not in owners else None
