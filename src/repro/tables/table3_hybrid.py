"""Table T3 — §7.2 Figure 5: hybrid operator microbenchmarks.

Single-operator queries (one join / one aggregation) over synthetic
keyed data, compiled three ways:

* **mpc-join / mpc-agg** — no trust annotations: the operator runs fully
  under secret-sharing MPC (O(n²) join, O(n log² n) sort-based agg);
* **hybrid-join / hybrid-agg** — key/group column annotated with a
  selectively-trusted third party: the §5.3 hybrid protocols apply;
* **public-join** — public key columns: the §5.3 public join avoids MPC
  altogether.

Aggregation splitting is disabled so the benchmark measures the
operator, not the push-down (as in the paper's Figure 5 setup).
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession

from ..bench_util import Point, run_point
from ..core import dag as D
from ..core.columns import Column, Party
from ..core.compiler import CompileOptions, compile_query
from ..core.lang import concat, newTable
from ..mpc.accounting import Meter
from ..runtime.engine import Engine


def _keyed(n: int, seed: int, n_keys: int, extra: str) -> pd.DataFrame:
    g = np.random.default_rng(seed)
    return pd.DataFrame(
        {
            "k": g.integers(1, n_keys + 1, n).astype(np.int64),
            extra: g.integers(0, 1000, n).astype(np.int64),
        }
    )


def _parties():
    return Party("a"), Party("b"), Party("c")


def _key_col(mode: str, pc: Party) -> Column:
    if mode == "public":
        return Column("k", public=True)
    if mode == "hybrid":
        return Column("k", trust=(pc,))
    return Column("k")


def _join_query(mode: str):
    pa, pb, pc = _parties()
    left = newTable([_key_col(mode, pc), Column("v")], at=pa, name="jl")
    right = newTable([_key_col(mode, pc), Column("w")], at=pb, name="jr")
    out = left.join(right, left="k", right="k").collect(to=[pa])
    return out, [pa, pb, pc]


def _agg_query(mode: str):
    pa, pb, pc = _parties()
    mk = lambda: [_key_col(mode, pc), Column("v")]  # noqa: E731
    t = concat(
        [newTable(mk(), at=pa, name="ga"), newTable(mk(), at=pb, name="gb")]
    )
    out = t.aggregate("s", D.SUM, group=["k"], over="v").collect(to=[pa])
    return out, [pa, pb, pc]


def _run_join(spark: SparkSession, mode: str, n: int) -> Meter:
    output, parties = _join_query(mode)
    plan = compile_query(
        output,
        CompileOptions(parties=parties, allow_cardinality_leaking_pushdown=False),
    )
    if mode == "mpc":
        assert [j.site for j in plan.dag.nodes_of_type(D.Join)] == [("mpc",)]
    eng = Engine(spark, [p.name for p in parties])
    data = {
        "jl": spark.createDataFrame(_keyed(n, 1, n, "v")),
        "jr": spark.createDataFrame(_keyed(n, 2, n, "w")),
    }
    eng.run(plan, data).collect()
    return eng.meter


def _run_agg(spark: SparkSession, mode: str, n_per_party: int) -> Meter:
    output, parties = _agg_query(mode)
    plan = compile_query(
        output,
        CompileOptions(parties=parties, allow_cardinality_leaking_pushdown=False),
    )
    eng = Engine(spark, [p.name for p in parties])
    n_keys = max(1, n_per_party // 10)
    data = {
        "ga": spark.createDataFrame(_keyed(n_per_party, 3, n_keys, "v")),
        "gb": spark.createDataFrame(_keyed(n_per_party, 4, n_keys, "v")),
    }
    eng.run(plan, data).collect()
    return eng.meter


FULL_NS = {
    "mpc-join": [200, 1000, 3000, 10_000],
    "hybrid-join": [1000, 10_000, 100_000, 200_000],
    "public-join": [1000, 10_000, 200_000, 2_000_000],
    "mpc-agg": [1000, 10_000, 50_000],
    "hybrid-agg": [10_000, 100_000, 1_000_000],
}
QUICK_NS = {
    "mpc-join": [200, 1000],
    "hybrid-join": [1000, 10_000],
    "public-join": [1000, 10_000],
    "mpc-agg": [1000, 10_000],
    "hybrid-agg": [10_000],
}


def run(spark: SparkSession, *, quick: bool = False) -> list[Point]:
    ns = QUICK_NS if quick else FULL_NS
    points: list[Point] = []
    for system, sizes in ns.items():
        op, mode = ("join", system.split("-")[0]) if "join" in system else (
            "agg", system.split("-")[0]
        )
        for n in sizes:
            if op == "join":
                points.append(
                    run_point(system, n, lambda: _run_join(spark, mode, n))
                )
            else:
                points.append(
                    run_point(system, n, lambda: _run_agg(spark, mode, n))
                )
    return points
