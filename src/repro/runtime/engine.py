"""Multi-party execution engine for compiled Conclave plans.

Interprets the annotated DAG in topological order, exactly mirroring the
paper's deployment model:

* each simulated party's local data lives in Spark DataFrames, and every
  ``("clear", party)`` node runs as Spark DataFrame transformations on
  that party's data (§4.1: "optionally, a parallel data processing
  system");
* ``("mpc",)`` nodes run on the selected MPC backend (Sharemind-style
  secret sharing or Obliv-C-style garbled circuits) over secret-shared
  state, entered via ``inputToMPC`` (``DataFrame.toPandas`` → share) and
  left via ``revealTo`` (reveal → ``spark.createDataFrame``);
* ``("hybrid", stp)`` nodes execute the §5.3 hybrid join / hybrid
  aggregation protocols, with the STP's cleartext steps in Spark;
* ``("public", party)`` nodes execute the public join: key columns move
  in the clear, only matching rows re-enter MPC (or, when nothing
  downstream needs MPC, the result is assembled in the clear).

All MPC/communication work is charged to one :class:`Meter`.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from ..backends.oblivc_sim import OblivcBackend
from ..backends.sharemind_sim import MASK, SharemindBackend, SSRel
from ..backends.spark_clear import exec_clear_node
from ..core import dag as D
from ..core.compiler import Plan
from ..mpc import protocols as P
from ..mpc.accounting import Meter
from ..mpc.secret_sharing import SecretSharingVM
from ..mpc.shared_rel import SharedRelation


@dataclass
class ClearVal:
    """A relation held in the clear at one party (a Spark DataFrame)."""

    party: str
    df: DataFrame


@dataclass
class PartVal:
    """A relation partitioned across parties, each part in the clear."""

    parts: dict[str, DataFrame]


class Engine:
    """Executes a compiled plan across simulated parties."""

    def __init__(
        self,
        spark: SparkSession,
        parties: list[str],
        *,
        backend: str = "sharemind",
        meter: Meter | None = None,
        seed: int = 17,
    ):
        self.spark = spark
        self.parties = list(parties)
        self.meter = meter if meter is not None else Meter()
        self.rng = np.random.default_rng(seed)
        if backend == "sharemind":
            self.vm = SecretSharingVM(
                n_parties=len(parties), meter=self.meter, seed=seed
            )
            self.backend = SharemindBackend(self.vm, self.rng)
        elif backend == "oblivc":
            self.vm = None
            self.backend = OblivcBackend(self.meter)
        else:  # pragma: no cover
            raise ValueError(backend)

    # ------------------------------------------------------------ helpers
    def _to_spark(self, pdf: pd.DataFrame) -> DataFrame:
        if len(pdf.columns) == 0:
            raise ValueError("empty schema")
        if len(pdf) == 0:
            # createDataFrame can't infer a schema from zero rows
            pdf = pdf.astype("float64")
        return self.spark.createDataFrame(pdf)

    def _charge_transfer(self, n_rows: int, n_cols: int) -> None:
        self.meter.charge_comm(rounds=1, bytes_sent=float(n_rows) * n_cols * 8)

    def _ensure_mpc(self, val):
        """inputToMPC: secret-share a clear (or partitioned) relation."""
        if isinstance(val, ClearVal):
            pdf = val.df.toPandas()
            return self.backend.input_rel(pdf.astype(np.int64))
        if isinstance(val, PartVal):
            shared = [
                self.backend.input_rel(df.toPandas().astype(np.int64))
                for _, df in sorted(val.parts.items())
            ]
            return self.backend.concat(shared)
        return val

    def _reveal_to(self, val, party: str) -> ClearVal:
        """revealTo: open an MPC value at one party as a Spark DataFrame."""
        pdf = self.backend.reveal(val)
        return ClearVal(party, self._to_spark(pdf))

    def _as_clear_at(self, val, party: str) -> DataFrame:
        if isinstance(val, ClearVal):
            if val.party != party:
                self._charge_transfer(val.df.count(), len(val.df.columns))
            return val.df
        if isinstance(val, PartVal):
            from functools import reduce

            return reduce(DataFrame.unionByName, val.parts.values())
        return self._reveal_to(val, party).df

    def _as_parts(self, val) -> dict[str, DataFrame]:
        if isinstance(val, PartVal):
            return val.parts
        if isinstance(val, ClearVal):
            return {val.party: val.df}
        raise TypeError("expected a cleartext relation")

    @staticmethod
    def _downstream_has_mpc(dag: D.Dag, node: D.Node) -> bool:
        cons = dag.consumers()
        stack, seen = list(cons.get(id(node), [])), set()
        while stack:
            n = stack.pop()
            if id(n) in seen:
                continue
            seen.add(id(n))
            if n.site and n.site[0] in ("mpc", "hybrid"):
                return True
            stack.extend(cons.get(id(n), []))
        return False

    # ---------------------------------------------------------------- run
    def run(self, plan: Plan, inputs: dict[str, DataFrame]) -> DataFrame:
        """Execute the plan; returns the recipient's result DataFrame."""
        self.meter.restart_wall()
        dag = plan.dag
        values: dict[int, object] = {}
        for n in dag.topo_order():
            values[id(n)] = self._exec_node(dag, n, inputs, values)
        out = values[id(dag.outputs[0])]
        assert isinstance(out, ClearVal)
        return out.df

    # ----------------------------------------------------------- dispatch
    def _exec_node(self, dag, n: D.Node, inputs, values):
        pvals = [values[id(p)] for p in n.parents]
        if isinstance(n, D.Input):
            df = inputs[n.name]
            return ClearVal(n.party.name, df.select(*n.out_cols))
        if isinstance(n, D.Output):
            party = n.recipients[0].name
            df = self._as_clear_at(pvals[0], party)
            return ClearVal(party, df)
        site = n.site
        assert site is not None, f"uncompiled node {n.name}"
        if isinstance(n, D.Concat) and site == ("mpc",):
            # a concat feeding a public join must stay partitioned in the
            # clear — the public join shares only the matching rows
            cons = dag.consumers().get(id(n), [])
            if cons and any(isinstance(c, D.PublicJoin) for c in cons):
                parts: dict[str, DataFrame] = {}
                for v in pvals:
                    for p, df in self._as_parts(v).items():
                        parts[p] = df if p not in parts else parts[p].unionByName(df)
                return PartVal(parts)
        if site[0] == "clear":
            return self._exec_clear(dag, n, site[1], pvals)
        if site[0] == "public":
            return self._exec_public_join(dag, n, pvals)
        if site[0] == "hybrid":
            if isinstance(n, D.HybridJoin):
                return self._exec_hybrid_join(n, pvals)
            return self._exec_hybrid_agg(n, pvals)
        return self._exec_mpc(n, pvals)

    # ------------------------------------------------------------- clear
    def _exec_clear(self, dag, n: D.Node, party: str, pvals):
        if isinstance(n, D.Concat) and not self._downstream_has_mpc(dag, n):
            # all-clear concat (insecure sub-plans only)
            dfs = [self._as_clear_at(v, party) for v in pvals]
            from functools import reduce

            return ClearVal(party, reduce(DataFrame.unionByName, dfs))
        if isinstance(n, D.Concat):
            # partitioned relation staying distributed until the MPC entry
            parts: dict[str, DataFrame] = {}
            for v in pvals:
                for p, df in self._as_parts(v).items():
                    parts[p] = df if p not in parts else parts[p].unionByName(df)
            return PartVal(parts)
        dfs = [self._as_clear_at(v, party) for v in pvals]
        return ClearVal(party, exec_clear_node(n, dfs))

    # --------------------------------------------------------------- mpc
    def _exec_mpc(self, n: D.Node, pvals):
        be = self.backend
        if isinstance(n, D.Concat):
            rels = []
            for v in pvals:
                if isinstance(v, (ClearVal, PartVal)):
                    rels.append(self._ensure_mpc(v))
                else:
                    rels.append(v)
            return be.concat(rels)
        if isinstance(n, D.Project):
            return be.project(self._ensure_mpc(pvals[0]), n.cols)
        if isinstance(n, D.Filter):
            if n.op != "==":
                raise NotImplementedError(f"MPC filter op {n.op}")
            return be.filter_eq(self._ensure_mpc(pvals[0]), n.col, n.value)
        if isinstance(n, D.Arith):
            return be.arith(
                self._ensure_mpc(pvals[0]), n.out_col, n.left, n.op, n.right
            )
        if isinstance(n, D.Aggregate):
            return be.aggregate(
                self._ensure_mpc(pvals[0]), n.group_cols, n.agg_op, n.over,
                n.out_col, input_sorted=n.input_sorted,
            )
        if isinstance(n, D.Join):
            return be.join(
                self._ensure_mpc(pvals[0]), self._ensure_mpc(pvals[1]),
                n.left_key, n.right_key,
            )
        if isinstance(n, D.DistinctCount):
            return be.distinct_count(
                self._ensure_mpc(pvals[0]), n.col, n.out_col,
                input_sorted=n.input_sorted,
            )
        if isinstance(n, D.SortBy):
            return be.sort_by(self._ensure_mpc(pvals[0]), n.col, n.ascending)
        if isinstance(n, D.Limit):
            return be.limit(self._ensure_mpc(pvals[0]), n.n)
        raise NotImplementedError(type(n))  # pragma: no cover

    # ------------------------------------------------------- public join
    def _exec_public_join(self, dag, n: D.PublicJoin, pvals):
        """§5.3 public join. Key columns are public: they travel in the
        clear to ``n.at``, which computes matching row-id pairs with a
        Spark join. Only matching rows then re-enter MPC (or, with no MPC
        downstream, the result is assembled in the clear)."""
        parts_l = {p: df.toPandas() for p, df in sorted(self._as_parts(pvals[0]).items())}
        parts_r = {p: df.toPandas() for p, df in sorted(self._as_parts(pvals[1]).items())}

        def keys_frame(parts: dict[str, pd.DataFrame], key: str):
            frames, offset = [], 0
            for _, pdf in parts.items():
                frames.append(
                    pd.DataFrame(
                        {key: pdf[key], "gid": np.arange(offset, offset + len(pdf))}
                    )
                )
                offset += len(pdf)
            return pd.concat(frames, ignore_index=True)

        lkeys = keys_frame(parts_l, n.left_key)
        rkeys = keys_frame(parts_r, n.right_key)
        # the key columns cross the network in the clear
        self._charge_transfer(len(lkeys) + len(rkeys), 2)
        # clear join at the chosen party, in Spark
        ldf = self._to_spark(lkeys).withColumnRenamed("gid", "lgid")
        rdf = self._to_spark(
            rkeys.rename(columns={n.right_key: n.left_key})
        ).withColumnRenamed("gid", "rgid")
        pairs = (
            ldf.join(rdf, on=n.left_key)
            .orderBy(n.left_key, "lgid", "rgid")
            .toPandas()
        )
        # index pairs go back to every party
        self._charge_transfer(len(pairs) * len(self.parties), 2)

        if not self._downstream_has_mpc(dag, n):
            # assemble the join result in the clear at `n.at` (reaches
            # the recipient anyway; §7.2 "public join avoids MPC")
            lfull = pd.concat(parts_l.values(), ignore_index=True)
            rfull = pd.concat(
                [p.drop(columns=[]) for p in parts_r.values()], ignore_index=True
            )
            self._charge_transfer(len(lfull), len(lfull.columns))
            self._charge_transfer(len(rfull), len(rfull.columns))
            left_sel = lfull.iloc[pairs["lgid"].to_numpy()].reset_index(drop=True)
            right_sel = (
                rfull.iloc[pairs["rgid"].to_numpy()]
                .drop(columns=[n.right_key])
                .reset_index(drop=True)
            )
            out = pd.concat([left_sel, right_sel], axis=1)
            return ClearVal(n.at, self._to_spark(out[n.out_cols]))

        # share only the matching rows of each partition into MPC
        def matched_shared(parts, gids: np.ndarray, drop_col: str | None):
            needed = np.unique(gids)
            pos_of = {g: i for i, g in enumerate(needed)}
            shared, offset = [], 0
            for _, pdf in parts.items():
                local = needed[(needed >= offset) & (needed < offset + len(pdf))]
                rows = pdf.iloc[local - offset]
                if drop_col is not None and drop_col in rows.columns:
                    rows = rows.drop(columns=[drop_col])
                if len(rows):
                    shared.append(self.backend.input_rel(rows.astype(np.int64)))
                offset += len(pdf)
            if not shared:
                empty = pd.DataFrame(
                    {c: np.zeros(0, np.int64) for c in (pdf.columns if drop_col is None
                     else [c for c in pdf.columns if c != drop_col])}
                )
                return self.backend.input_rel(empty), pos_of
            return self.backend.concat(shared), pos_of

        left_shared, lpos = matched_shared(parts_l, pairs["lgid"].to_numpy(), None)
        right_shared, rpos = matched_shared(
            parts_r, pairs["rgid"].to_numpy(), n.right_key
        )
        li = np.array([lpos[g] for g in pairs["lgid"]], dtype=np.int64)
        ri = np.array([rpos[g] for g in pairs["rgid"]], dtype=np.int64)
        # public indices: selection is share-local (free)
        left_sel = self._take_public(left_shared, li)
        right_sel = self._take_public(right_shared, ri)
        return self.backend.concat_columns(left_sel, right_sel)

    def _take_public(self, rel, idx: np.ndarray):
        if isinstance(rel, SSRel):
            return SSRel(
                SharedRelation(
                    {c: self.vm.take(v, idx) for c, v in rel.rel.columns.items()}
                ),
                dict(rel.scales),
            )
        from ..mpc.gc_backend import GCRelation

        return GCRelation(rel.pdf.iloc[idx].reset_index(drop=True))

    # ------------------------------------------------------- hybrid join
    def _exec_hybrid_join(self, n: D.HybridJoin, pvals):
        """§5.3 hybrid join (Figure 3): oblivious shuffles, key columns
        revealed to the STP, clear join + enumeration at the STP (in
        Spark), oblivious indexing to rebuild the result under MPC."""
        be = self.backend
        if not isinstance(be, SharemindBackend):
            raise NotImplementedError("hybrid operators need the secret-sharing backend")
        left = be.shuffle(self._ensure_mpc(pvals[0]))
        right = be.shuffle(self._ensure_mpc(pvals[1]))
        # reveal key-only projections to the STP
        lk = be.reveal_col_to(left, n.left_key, n.stp)
        rk = be.reveal_col_to(right, n.right_key, n.stp)
        # STP: enumerate + clear join in Spark
        ldf = self._to_spark(pd.DataFrame({"k": lk, "li": np.arange(len(lk))}))
        rdf = self._to_spark(pd.DataFrame({"k": rk, "ri": np.arange(len(rk))}))
        pairs = ldf.join(rdf, on="k").orderBy("li", "ri").toPandas()
        li = pairs["li"].to_numpy().astype(np.int64)
        ri = pairs["ri"].to_numpy().astype(np.int64)
        # STP secret-shares the index relations (inputToMPC)
        self._charge_transfer(len(li) + len(ri), 1)
        # oblivious indexing back under MPC
        left_rows = be.select_rows(left, li)
        right_rows = be.select_rows(
            be.project(right, [c for c in right.rel.column_names
                               if c not in (n.right_key, MASK)]),
            ri,
        )
        res = be.concat_columns(left_rows, right_rows)
        return be.shuffle(res)

    # ------------------------------------------------ hybrid aggregation
    def _exec_hybrid_agg(self, n: D.HybridAggregate, pvals):
        """§5.3 hybrid aggregation: shuffle, reveal the group-by column
        to the STP, clear sort at the STP (Spark), public reorder,
        oblivious accumulation with STP-shared equality flags, shuffle +
        flag reveal to drop non-group-end rows."""
        be = self.backend
        if not isinstance(be, SharemindBackend):
            raise NotImplementedError("hybrid operators need the secret-sharing backend")
        rel = be.shuffle(self._ensure_mpc(pvals[0]))
        group = n.group_cols[0]
        keys = be.reveal_col_to(rel, group, n.stp)
        # STP: sort the (key, idx) relation in the clear, in Spark
        kdf = self._to_spark(
            pd.DataFrame({"k": keys, "idx": np.arange(len(keys))})
        )
        ordered = kdf.orderBy("k", "idx").toPandas()
        order = ordered["idx"].to_numpy().astype(np.int64)
        sorted_keys = ordered["k"].to_numpy()
        eq = np.zeros(len(keys), dtype=np.int64)
        if len(keys) > 1:
            eq[1:] = (sorted_keys[1:] == sorted_keys[:-1]).astype(np.int64)
        # indexes travel in the clear; parties reorder locally (free)
        self._charge_transfer(len(order) * len(self.parties), 1)
        reordered = be.reorder_public(rel, order)
        # STP secret-shares the equality flags
        same = self.vm.share(eq)
        val = be._masked_value(reordered, n.over, n.agg_op)
        scale = reordered.scale_of(n.over) if (n.agg_op == D.SUM and n.over) else 0
        sums = P.segmented_scan_sum(self.vm, val, same)
        nrows = len(eq)
        is_end = np.ones(nrows, dtype=np.int64)
        is_end[: nrows - 1] = 1 - eq[1:]
        staged = SSRel(
            SharedRelation(
                {
                    group: reordered.rel.columns[group],
                    n.out_col: sums,
                    "__end": self.vm.share(is_end),
                }
            ),
            {n.out_col: scale} if scale else {},
        )
        shuffled = be.shuffle(staged)
        flags = self.vm.reveal(shuffled.rel.columns["__end"])
        keep = np.nonzero(flags == 1)[0]
        kept = self._take_public(
            SSRel(
                SharedRelation(
                    {
                        group: shuffled.rel.columns[group],
                        n.out_col: shuffled.rel.columns[n.out_col],
                    }
                ),
                shuffled.scales,
            ),
            keep,
        )
        return kept
