"""Tests for the LINQ-style frontend: schema propagation and misuse
errors."""
import pytest

from repro.core import dag as D
from repro.core.columns import Column, Party
from repro.core.lang import concat, newTable


@pytest.fixture()
def t():
    return newTable([Column("a"), Column("b")], at=Party("x"), name="t")


def test_newtable_schema(t):
    assert t.node.out_cols == ["a", "b"]
    assert isinstance(t.node, D.Input)
    assert t.node.party == Party("x")


def test_project_schema_and_unknown_column(t):
    assert t.project(["b"]).node.out_cols == ["b"]
    with pytest.raises(ValueError):
        t.project(["zzz"])


def test_filter_unknown_column(t):
    with pytest.raises(ValueError):
        t.filter("zzz", "==", 1)


def test_aggregate_schema(t):
    agg = t.aggregate("s", D.SUM, group=["a"], over="b")
    assert agg.node.out_cols == ["a", "s"]
    scalar = t.aggregate("s", D.SUM, over="b")
    assert scalar.node.out_cols == ["s"]


def test_sum_requires_over(t):
    with pytest.raises(ValueError):
        t.aggregate("s", D.SUM, group=["a"])


def test_arith_appends_column(t):
    m = t.multiply("m", "a", "b")
    assert m.node.out_cols == ["a", "b", "m"]
    d = m.divide("d", "m", by=2)
    assert d.node.out_cols == ["a", "b", "m", "d"]


def test_join_schema_drops_right_key(t):
    u = newTable([Column("a"), Column("c")], at=Party("y"), name="u")
    j = t.join(u, left="a", right="a")
    assert j.node.out_cols == ["a", "b", "c"]


def test_join_rejects_duplicate_columns(t):
    u = newTable([Column("a"), Column("b")], at=Party("y"), name="u")
    with pytest.raises(ValueError):
        t.join(u, left="a", right="a")  # both sides carry "b"


def test_cross_schema(t):
    u = newTable([Column("c")], at=Party("y"), name="u")
    assert t.cross(u).node.out_cols == ["a", "b", "c"]


def test_concat_requires_identical_schemas(t):
    u = newTable([Column("a")], at=Party("y"), name="u")
    with pytest.raises(ValueError):
        concat([t, u])


def test_collect_builds_output(t):
    out = t.collect(to=[Party("x"), Party("y")])
    assert isinstance(out, D.Output)
    assert [p.name for p in out.recipients] == ["x", "y"]


def test_distinct_sort_limit_nodes(t):
    dc = t.distinct_count("a", "n")
    assert dc.node.out_cols == ["n"]
    sb = t.sort_by("a", ascending=False)
    assert isinstance(sb.node, D.SortBy) and not sb.node.ascending
    lm = sb.limit(5)
    assert isinstance(lm.node, D.Limit) and lm.node.n == 5


def test_column_trust_set_resolution():
    pa, pb, pc = Party("a"), Party("b"), Party("c")
    parties = [pa, pb, pc]
    assert Column("x").trust_set(pa, parties) == {"a"}
    assert Column("x", trust=(pb,)).trust_set(pa, parties) == {"a", "b"}
    assert Column("x", public=True).trust_set(pa, parties) == {"a", "b", "c"}


def test_dag_topo_order_parents_first(t):
    out = t.project(["a"]).filter("a", "==", 1).collect(to=[Party("x")])
    order = D.Dag([out]).topo_order()
    pos = {id(n): i for i, n in enumerate(order)}
    for n in order:
        for p in n.parents:
            assert pos[id(p)] < pos[id(n)]


def test_dag_replace_node(t):
    proj = t.project(["a"])
    out = proj.collect(to=[Party("x")])
    dag = D.Dag([out])
    new = D.Project([t.node], ["b"], cols=["b"])
    dag.replace_node(proj.node, new)
    assert out.parents == [new]
