"""The six-stage Conclave query compiler (§5).

``compile_query`` runs the paper's pipeline over a frontend-built DAG:

1. ownership propagation (§5.1 pass 1);
2. MPC-frontier push-down: concat push-down + aggregation splitting
   (§5.2) — cardinality-leaking splits only with party consent;
3. trust-set propagation (§5.1 pass 2);
4. hybrid-operator rewrites where trust annotations authorize them
   (§5.3);
5. push-up of reversible leaf operators (§5.2) and sort-order tracking /
   oblivious-sort elimination (§5.4);
6. site assignment — every node is pinned to ``("clear", party)``,
   ``("mpc",)``, ``("hybrid", stp)`` or ``("public", party)``; the
   runtime engine interprets the annotated DAG in topological order,
   entering/leaving MPC at site transitions.

All passes are deterministic, so every party derives the identical plan
(the paper's requirement that parties agree on the computation).
"""
from __future__ import annotations

from dataclasses import dataclass, field

from .columns import Party
from . import dag as D
from .frontier import push_down_concat, push_up, split_aggregations
from .hybrid import apply_hybrid_rewrites
from .ownership import propagate_ownership
from .sortopt import track_sort_orders
from .trust import propagate_trust


@dataclass
class CompileOptions:
    parties: list[Party] = field(default_factory=list)
    #: party consent for push-downs that leak per-party cardinalities
    allow_cardinality_leaking_pushdown: bool = True
    enable_hybrid: bool = True
    enable_public_join: bool = True
    enable_sort_elimination: bool = True
    enable_push_up: bool = True


@dataclass
class Plan:
    """The compiled physical plan: the annotated DAG plus stats."""

    dag: D.Dag
    options: CompileOptions
    rewrites: dict[str, int] = field(default_factory=dict)

    def nodes(self) -> list[D.Node]:
        return self.dag.topo_order()

    def mpc_nodes(self) -> list[D.Node]:
        return [n for n in self.nodes() if n.site and n.site[0] != "clear"]

    def describe(self) -> str:
        lines = []
        for n in self.nodes():
            extra = ""
            if n.input_sorted:
                extra += " [sort-eliminated]"
            lines.append(f"{n.op_name():<16} {n.name:<28} site={n.site}{extra}")
        return "\n".join(lines)


def _assign_sites(dag: D.Dag) -> None:
    for n in dag.topo_order():
        if isinstance(n, D.Input):
            n.site = ("clear", n.party.name)
        elif isinstance(n, D.Output):
            n.site = ("clear", n.recipients[0].name)
        elif n.forced_site is not None:
            n.site = n.forced_site
        elif isinstance(n, (D.HybridJoin, D.HybridAggregate)):
            n.site = ("hybrid", n.stp)
        elif isinstance(n, D.PublicJoin):
            n.site = ("public", n.at)
        elif n.owner is not None:
            n.site = ("clear", n.owner)
        else:
            n.site = ("mpc",)


def compile_query(
    outputs: list[D.Output] | D.Output, options: CompileOptions
) -> Plan:
    if isinstance(outputs, D.Output):
        outputs = [outputs]
    dag = D.Dag(outputs)
    rewrites: dict[str, int] = {}

    # 1: ownership over the raw query
    propagate_ownership(dag)

    # 2: frontier push-down
    rewrites["concat_pushdown"] = push_down_concat(dag)
    propagate_ownership(dag)
    if options.allow_cardinality_leaking_pushdown:
        rewrites["aggregation_split"] = split_aggregations(dag)
        propagate_ownership(dag)
        # local pre-aggregations may expose new concat push-down chances
        rewrites["concat_pushdown"] += push_down_concat(dag)
        propagate_ownership(dag)

    # 3: trust propagation over the rewritten DAG
    propagate_trust(dag, options.parties)

    # 4: hybrid rewrites (authorization from propagated trust sets)
    rewrites["hybrid"] = apply_hybrid_rewrites(
        dag,
        options.parties,
        enable_hybrid=options.enable_hybrid,
        enable_public_join=options.enable_public_join,
    )
    propagate_ownership(dag)
    propagate_trust(dag, options.parties)

    # 5: push-up + sort tracking
    if options.enable_push_up:
        rewrites["push_up"] = push_up(dag)
        propagate_ownership(dag)
        propagate_trust(dag, options.parties)
    track_sort_orders(dag, enabled=options.enable_sort_elimination)

    # 6: site assignment
    _assign_sites(dag)
    return Plan(dag=dag, options=options, rewrites=rewrites)
