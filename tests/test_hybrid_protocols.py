"""Unit tests for the §5.3 hybrid operator protocols in the engine:
correctness against pandas ground truth, cost advantages, and the
leakage discipline (the STP sees key/group columns only)."""
import numpy as np
import pandas as pd
import pytest

from repro.backends.sharemind_sim import SharemindBackend
from repro.core import dag as D
from repro.core.columns import Column, Party
from repro.core.compiler import CompileOptions, compile_query
from repro.core.lang import concat, newTable
from repro.runtime.engine import Engine


def _parties():
    return Party("a"), Party("b"), Party("c")


def _join_plan(mode: str):
    pa, pb, pc = _parties()
    key = (
        Column("k", public=True) if mode == "public"
        else Column("k", trust=(pc,)) if mode == "hybrid"
        else Column("k")
    )
    key2 = (
        Column("k", public=True) if mode == "public"
        else Column("k", trust=(pc,)) if mode == "hybrid"
        else Column("k")
    )
    left = newTable([key, Column("v")], at=pa, name="jl")
    right = newTable([key2, Column("w")], at=pb, name="jr")
    out = left.join(right, left="k", right="k").collect(to=[pa])
    plan = compile_query(out, CompileOptions(parties=[pa, pb, pc]))
    return plan, [pa, pb, pc]


def _data(spark, n=40, seed=0, n_keys=15):
    g = np.random.default_rng(seed)
    jl = pd.DataFrame({"k": g.integers(0, n_keys, n), "v": g.integers(0, 99, n)})
    jr = pd.DataFrame({"k": g.integers(0, n_keys, n), "w": g.integers(0, 99, n)})
    jl, jr = jl.astype(np.int64), jr.astype(np.int64)
    return {
        "jl": spark.createDataFrame(jl),
        "jr": spark.createDataFrame(jr),
    }, jl, jr


@pytest.mark.parametrize("mode", ["mpc", "hybrid", "public"])
def test_join_modes_agree_with_pandas(spark, mode):
    plan, parties = _join_plan(mode)
    data, jl, jr = _data(spark, seed=3)
    eng = Engine(spark, [p.name for p in parties])
    got = (
        eng.run(plan, data).toPandas().sort_values(["k", "v", "w"])
        .reset_index(drop=True).astype(np.int64)
    )
    expected = (
        jl.merge(jr, on="k").sort_values(["k", "v", "w"]).reset_index(drop=True)
    )
    pd.testing.assert_frame_equal(got[["k", "v", "w"]], expected, check_dtype=False)


def test_hybrid_join_cheaper_than_mpc_join(spark):
    costs = {}
    for mode in ("mpc", "hybrid"):
        plan, parties = _join_plan(mode)
        # ~1 match per key so the O(n²) vs O((n+m)·log) gap is visible
        data, *_ = _data(spark, n=400, seed=1, n_keys=400)
        eng = Engine(spark, [p.name for p in parties])
        eng.run(plan, data)
        costs[mode] = eng.meter.bytes_sent
    assert costs["hybrid"] < costs["mpc"] / 3


def test_public_join_clear_assembly_avoids_mpc(spark):
    """A public join whose result goes straight to the recipient needs
    no sharing at all (§7.2: 'the public variant avoids MPC')."""
    plan, parties = _join_plan("public")
    data, *_ = _data(spark, n=200, seed=2)
    eng = Engine(spark, [p.name for p in parties])
    eng.run(plan, data)
    # clear transfers only: key exchange, index broadcast, row shipping —
    # no secret-sharing rounds, no oblivious sub-protocols
    assert eng.meter.rounds <= 5


def test_hybrid_join_stp_sees_only_key_columns(spark, monkeypatch):
    """Leakage discipline: during a hybrid join the STP receives the key
    columns (and nothing else) in the clear."""
    revealed = []
    orig = SharemindBackend.reveal_col_to

    def spy(self, rel, col, party):
        revealed.append((col, party))
        return orig(self, rel, col, party)

    monkeypatch.setattr(SharemindBackend, "reveal_col_to", spy)
    plan, parties = _join_plan("hybrid")
    data, *_ = _data(spark, seed=4)
    eng = Engine(spark, [p.name for p in parties])
    eng.run(plan, data)
    assert revealed and all(col == "k" for col, _ in revealed)
    assert all(party == "c" for _, party in revealed)


def _agg_plan(mode: str):
    pa, pb, pc = _parties()
    mk = lambda: [  # noqa: E731
        Column("k", trust=(pc,)) if mode == "hybrid" else Column("k"),
        Column("v"),
    ]
    t = concat([newTable(mk(), at=pa, name="ga"), newTable(mk(), at=pb, name="gb")])
    out = t.aggregate("s", D.SUM, group=["k"], over="v").collect(to=[pa])
    plan = compile_query(
        out,
        CompileOptions(parties=[pa, pb, pc], allow_cardinality_leaking_pushdown=False),
    )
    return plan, [pa, pb, pc]


@pytest.mark.parametrize("mode", ["mpc", "hybrid"])
def test_agg_modes_agree_with_pandas(spark, mode):
    plan, parties = _agg_plan(mode)
    g = np.random.default_rng(9)
    ga = pd.DataFrame({"k": g.integers(0, 8, 50), "v": g.integers(0, 99, 50)}).astype(np.int64)
    gb = pd.DataFrame({"k": g.integers(0, 8, 50), "v": g.integers(0, 99, 50)}).astype(np.int64)
    eng = Engine(spark, [p.name for p in parties])
    got = (
        eng.run(plan, {"ga": spark.createDataFrame(ga), "gb": spark.createDataFrame(gb)})
        .toPandas().sort_values("k").reset_index(drop=True)
    )
    expected = (
        pd.concat([ga, gb]).groupby("k", as_index=False)["v"].sum()
        .rename(columns={"v": "s"})
    )
    pd.testing.assert_frame_equal(got, expected, check_dtype=False)


def test_hybrid_agg_site_and_cost(spark):
    costs = {}
    for mode in ("mpc", "hybrid"):
        plan, parties = _agg_plan(mode)
        if mode == "hybrid":
            assert plan.dag.nodes_of_type(D.HybridAggregate)
        g = np.random.default_rng(1)
        mkdf = lambda s: pd.DataFrame(  # noqa: E731
            {"k": g.integers(0, 50, 500), "v": g.integers(0, 9, 500)}
        ).astype(np.int64)
        eng = Engine(spark, [p.name for p in parties])
        eng.run(
            plan,
            {"ga": spark.createDataFrame(mkdf(1)), "gb": spark.createDataFrame(mkdf(2))},
        )
        costs[mode] = eng.meter.rounds
    # clear sort at the STP removes the O(n log^2 n) oblivious sort rounds
    assert costs["hybrid"] < costs["mpc"] / 2


def test_hybrid_agg_stp_sees_only_group_column(spark, monkeypatch):
    revealed = []
    orig = SharemindBackend.reveal_col_to

    def spy(self, rel, col, party):
        revealed.append((col, party))
        return orig(self, rel, col, party)

    monkeypatch.setattr(SharemindBackend, "reveal_col_to", spy)
    plan, parties = _agg_plan("hybrid")
    g = np.random.default_rng(2)
    df = lambda: pd.DataFrame(  # noqa: E731
        {"k": g.integers(0, 5, 30), "v": g.integers(0, 9, 30)}
    ).astype(np.int64)
    eng = Engine(spark, [p.name for p in parties])
    eng.run(
        plan, {"ga": spark.createDataFrame(df()), "gb": spark.createDataFrame(df())}
    )
    assert revealed and all(col == "k" and party == "c" for col, party in revealed)


def test_hybrid_ops_require_secret_sharing_backend(spark):
    plan, parties = _join_plan("hybrid")
    data, *_ = _data(spark, seed=5)
    eng = Engine(spark, [p.name for p in parties], backend="oblivc")
    with pytest.raises(NotImplementedError):
        eng.run(plan, data)
