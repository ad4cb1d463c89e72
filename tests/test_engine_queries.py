"""End-to-end multi-party execution of the paper's queries, checked
against DuckDB over the cleartext union of inputs (the repro's
correctness oracle). Every test runs the full compiled plan: local
Spark stages, inputToMPC sharing, simulated MPC protocols, hybrid
operators, and the final reveal."""
import numpy as np
import pandas as pd
import pytest

import duckdb

from repro.core.compiler import CompileOptions, compile_query
from repro.oracle import assert_equivalent
from repro.queries import aspirin, comorbidity, credit_card, market_concentration
from repro.queries.base import gen_to_spark
from repro.runtime.engine import Engine


def _oracle(sql: str, gen: dict[str, pd.DataFrame]) -> pd.DataFrame:
    con = duckdb.connect()
    try:
        for name, pdf in gen.items():
            con.register(name, pdf)
        return con.execute(sql).fetchdf()
    finally:
        con.close()


def _run(spark, mod, gen, **copts):
    spec = mod.build() if not copts.pop("_spec", None) else copts.pop("_spec")
    plan = compile_query(spec.output, CompileOptions(parties=spec.parties, **copts))
    eng = Engine(spark, [p.name for p in spec.parties])
    df = eng.run(plan, gen_to_spark(spark, gen))
    return spec, plan, eng, df


# --------------------------------------------------- market concentration
def test_market_concentration_end_to_end(spark):
    gen = market_concentration.gen_inputs(n_per_party=400)
    spec, plan, eng, df = _run(spark, market_concentration, gen)
    got = df.toPandas()["hhi"].iloc[0]
    expected = _oracle(spec.oracle_sql, gen)["hhi"].iloc[0]
    # fixed-point division under MPC: compare with tolerance
    assert got == pytest.approx(expected, abs=1e-4)


def test_market_concentration_no_pushdown_same_result(spark):
    gen = market_concentration.gen_inputs(n_per_party=60)
    spec, plan, eng, df = _run(
        spark, market_concentration, gen, allow_cardinality_leaking_pushdown=False
    )
    got = df.toPandas()["hhi"].iloc[0]
    expected = _oracle(spec.oracle_sql, gen)["hhi"].iloc[0]
    assert got == pytest.approx(expected, abs=1e-4)


def test_market_pushdown_reduces_mpc_cost(spark):
    gen = market_concentration.gen_inputs(n_per_party=300)
    meters = {}
    for allow in (True, False):
        spec = market_concentration.build()
        plan = compile_query(
            spec.output,
            CompileOptions(
                parties=spec.parties, allow_cardinality_leaking_pushdown=allow
            ),
        )
        eng = Engine(spark, [p.name for p in spec.parties])
        eng.run(plan, gen_to_spark(spark, gen))
        meters[allow] = eng.meter
    # with the split, only a handful of rows enter MPC
    assert meters[True].bytes_sent < meters[False].bytes_sent / 10


def test_market_insecure_spark_baseline(spark):
    from repro.backends.spark_clear import run_query_clear

    gen = market_concentration.gen_inputs(n_per_party=500)
    spec = market_concentration.build()
    df = run_query_clear(spark, spec.output, gen_to_spark(spark, gen))
    got = df.toPandas()["hhi"].iloc[0]
    expected = _oracle(spec.oracle_sql, gen)["hhi"].iloc[0]
    assert got == pytest.approx(expected, rel=1e-9)


# --------------------------------------------------------- credit card
def _check_credit(spark, gen, **copts):
    spec, plan, eng, df = _run(spark, credit_card, gen, **copts)
    got = df.toPandas().sort_values("zip").reset_index(drop=True)
    expected = (
        _oracle(spec.oracle_sql, gen).sort_values("zip").reset_index(drop=True)
    )
    # integer columns must match exactly (oracle discipline); the MPC
    # fixed-point average gets a tolerance
    assert_equivalent(
        spark.createDataFrame(got[["zip", "total", "cnt"]]),
        "SELECT zip, SUM(score) AS total, COUNT(*) AS cnt FROM ("
        "  SELECT d.zip AS zip, s.score AS score FROM demographics d "
        "  JOIN (SELECT * FROM scores_b UNION ALL SELECT * FROM scores_c) s "
        "  ON d.ssn = s.ssn) GROUP BY zip",
        **gen,
    )
    np.testing.assert_allclose(
        got["avg_score"].to_numpy(), expected["avg_score"].to_numpy(), atol=1e-4
    )
    return plan, eng


def test_credit_card_hybrid_end_to_end(spark):
    gen = credit_card.gen_inputs(n_holders=300)
    plan, eng = _check_credit(spark, gen)
    from repro.core import dag as D

    assert plan.dag.nodes_of_type(D.HybridJoin)  # ran the hybrid path


def test_credit_card_pure_mpc_same_result(spark):
    gen = credit_card.gen_inputs(n_holders=120)
    plan, eng = _check_credit(
        spark, gen, enable_hybrid=False, enable_public_join=False
    )
    from repro.core import dag as D

    assert not plan.dag.nodes_of_type(D.HybridJoin)


def test_credit_hybrid_cheaper_than_mpc(spark):
    gen = credit_card.gen_inputs(n_holders=400)
    costs = {}
    for hybrid in (True, False):
        spec = credit_card.build()
        plan = compile_query(
            spec.output,
            CompileOptions(
                parties=spec.parties, enable_hybrid=hybrid,
                enable_public_join=hybrid,
            ),
        )
        eng = Engine(spark, [p.name for p in spec.parties])
        eng.run(plan, gen_to_spark(spark, gen))
        costs[hybrid] = eng.meter.bytes_sent
    assert costs[True] < costs[False] / 5  # O(n log n) vs O(n^2)


# ------------------------------------------------------------- aspirin
def test_aspirin_end_to_end(spark):
    gen = aspirin.gen_inputs(n_per_party=300, overlap_frac=0.1)
    spec, plan, eng, df = _run(spark, aspirin, gen)
    assert_equivalent(df, spec.oracle_sql, **gen)


def test_aspirin_no_cross_party_overlap(spark):
    """With disjoint patient pools the join still matches within each
    hospital; the result must equal the oracle's."""
    gen = aspirin.gen_inputs(n_per_party=100, overlap_frac=0.0)
    spec, plan, eng, df = _run(spark, aspirin, gen)
    assert_equivalent(df, spec.oracle_sql, **gen)


def test_aspirin_sort_elimination_same_answer_lower_cost(spark):
    gen = aspirin.gen_inputs(n_per_party=400, overlap_frac=0.2)
    results, costs = {}, {}
    for elim in (True, False):
        spec = aspirin.build()
        plan = compile_query(
            spec.output,
            CompileOptions(parties=spec.parties, enable_sort_elimination=elim),
        )
        eng = Engine(spark, [p.name for p in spec.parties])
        df = eng.run(plan, gen_to_spark(spark, gen))
        results[elim] = df.toPandas()["rx_cnt"].iloc[0]
        costs[elim] = eng.meter.rounds
    assert results[True] == results[False]
    assert costs[True] < costs[False]  # no oblivious sort rounds


def test_aspirin_public_join_only_shares_overlap(spark):
    """Only rows for patient IDs present at both parties enter MPC: the
    bytes shared should track the overlap, not the full input."""
    small = aspirin.gen_inputs(n_per_party=400, overlap_frac=0.02, seed=3)
    big = aspirin.gen_inputs(n_per_party=400, overlap_frac=0.9, seed=3)
    byts = {}
    for name, gen in [("small", small), ("big", big)]:
        spec, plan, eng, df = _run(spark, aspirin, gen)
        assert_equivalent(df, spec.oracle_sql, **gen)
        byts[name] = eng.meter.bytes_sent
    # the full 2%-only-enters-MPC effect needs SMCQL-style slicing on
    # top (tested in test_smcql.py); the public join alone already scales
    # shared bytes with the match count
    assert byts["small"] < byts["big"] / 1.5


# ---------------------------------------------------------- comorbidity
def test_comorbidity_end_to_end(spark):
    gen = comorbidity.gen_inputs(n_per_party=500, distinct_key_frac=0.05)
    spec, plan, eng, df = _run(spark, comorbidity, gen)
    got = sorted(df.toPandas()["cnt"].tolist(), reverse=True)
    expected = _oracle(spec.oracle_sql, gen)["cnt"].tolist()
    # ties make the diag picks ambiguous; the count multiset is exact
    assert got == expected


def test_comorbidity_small_key_space(spark):
    gen = comorbidity.gen_inputs(n_per_party=60, distinct_key_frac=0.04)
    spec, plan, eng, df = _run(spark, comorbidity, gen)
    got = df.toPandas()
    full = _oracle(
        "SELECT diag, COUNT(*) AS cnt FROM ("
        "SELECT * FROM cdiag_h1 UNION ALL SELECT * FROM cdiag_h2) GROUP BY diag",
        gen,
    )
    merged = got.merge(full, on="diag", suffixes=("_got", "_exp"))
    # fewer keys than TOP_K: every group must be present and exact
    assert len(got) == len(full)
    np.testing.assert_array_equal(merged["cnt_got"], merged["cnt_exp"])


# -------------------------------------------------- engine odds and ends
def test_engine_rejects_unknown_backend(spark):
    with pytest.raises(ValueError):
        Engine(spark, ["a", "b"], backend="sgx")


def test_engine_meter_accumulates(spark):
    gen = market_concentration.gen_inputs(n_per_party=50)
    spec, plan, eng, df = _run(spark, market_concentration, gen)
    assert eng.meter.rounds > 0
    assert eng.meter.bytes_sent > 0
    assert eng.meter.hybrid_seconds() > 0
