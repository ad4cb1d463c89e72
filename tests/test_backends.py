"""Tests for the engine-facing backend adapters (Sharemind-sim SSRel
ops with fixed-point scales and masks; Obliv-C-sim adapter)."""
import numpy as np
import pandas as pd
import pytest

from repro.backends.oblivc_sim import OblivcBackend
from repro.backends.sharemind_sim import FP_BITS, MASK, SharemindBackend, SSRel
from repro.mpc.accounting import Meter
from repro.mpc.secret_sharing import SecretSharingVM


@pytest.fixture()
def be() -> SharemindBackend:
    vm = SecretSharingVM(3, Meter(), seed=21)
    return SharemindBackend(vm, np.random.default_rng(21))


def _pdf(**cols):
    return pd.DataFrame({k: np.asarray(v, np.int64) for k, v in cols.items()})


# ---------------------------------------------------------- sharemind-sim
def test_input_reveal_roundtrip(be):
    pdf = _pdf(a=[1, -2, 3], b=[7, 8, 9])
    out = be.reveal(be.input_rel(pdf))
    pd.testing.assert_frame_equal(out, pdf)


def test_concat_and_project(be):
    r1 = be.input_rel(_pdf(a=[1], b=[2]))
    r2 = be.input_rel(_pdf(a=[3], b=[4]))
    both = be.concat([r1, r2])
    out = be.reveal(be.project(both, ["b"]))
    np.testing.assert_array_equal(out["b"], [2, 4])


def test_filter_masks_and_reveal_drops_rows(be):
    r = be.input_rel(_pdf(a=[1, 2, 1], b=[10, 20, 30]))
    f = be.filter_eq(r, "a", 1)
    assert f.has_mask
    out = be.reveal(f)
    np.testing.assert_array_equal(out["b"], [10, 30])


def test_chained_filters_intersect(be):
    r = be.input_rel(_pdf(a=[1, 1, 2], b=[5, 6, 5]))
    f = be.filter_eq(be.filter_eq(r, "a", 1), "b", 5)
    out = be.reveal(f)
    assert len(out) == 1 and out["b"].iloc[0] == 5


def test_arith_multiply_columns(be):
    r = be.input_rel(_pdf(x=[2, 3], y=[5, 7]))
    out = be.reveal(be.arith(r, "z", "x", "*", "y"))
    np.testing.assert_array_equal(out["z"], [10, 21])


def test_arith_multiply_scalar(be):
    r = be.input_rel(_pdf(x=[2, -3]))
    out = be.reveal(be.arith(r, "z", "x", "*", 10))
    np.testing.assert_array_equal(out["z"], [20, -30])


def test_arith_divide_fixed_point_descaled(be):
    r = be.input_rel(_pdf(num=[1, 3], den=[2, 4]))
    d = be.arith(r, "q", "num", "/", "den")
    assert d.scale_of("q") == FP_BITS
    out = be.reveal(d)
    np.testing.assert_allclose(out["q"], [0.5, 0.75], atol=1e-5)


def test_arith_divide_then_square_scale_chain(be):
    r = be.input_rel(_pdf(num=[1], den=[4]))
    d = be.arith(r, "q", "num", "/", "den")
    sq = be.arith(d, "q2", "q", "*", "q")
    assert sq.scale_of("q2") == 2 * FP_BITS
    out = be.reveal(sq)
    assert out["q2"].iloc[0] == pytest.approx(0.0625, abs=1e-5)


def test_aggregate_grouped_and_scalar(be):
    r = be.input_rel(_pdf(k=[1, 2, 1], v=[10, 20, 30]))
    g = be.reveal(be.aggregate(r, ["k"], "sum", "v", "s")).sort_values("k")
    np.testing.assert_array_equal(g["s"], [40, 20])
    s = be.reveal(be.aggregate(r, [], "sum", "v", "s"))
    assert s["s"].iloc[0] == 60


def test_aggregate_count_with_mask(be):
    r = be.input_rel(_pdf(k=[1, 1, 2], f=[1, 0, 1]))
    r = be.filter_eq(r, "f", 1)
    g = be.reveal(be.aggregate(r, ["k"], "count", None, "c")).sort_values("k")
    # masked rows contribute 0 to the count; zero-count groups are
    # indistinguishable from absent under the oblivious protocol
    got = dict(zip(g["k"], g["c"]))
    assert got.get(1, 0) == 1 and got.get(2, 0) == 1


def test_join_and_cross(be):
    l = be.input_rel(_pdf(k=[1, 2], a=[10, 20]))
    r = be.input_rel(_pdf(k=[2, 3], b=[7, 8]))
    out = be.reveal(be.join(l, r, "k", "k"))
    assert out.to_dict("records") == [{"k": 2, "a": 20, "b": 7}]
    scalar = be.input_rel(_pdf(t=[100]))
    crossed = be.reveal(be.join(l, scalar, "", ""))
    np.testing.assert_array_equal(crossed["t"], [100, 100])


def test_cross_join_requires_scalar_right(be):
    l = be.input_rel(_pdf(k=[1, 2]))
    r = be.input_rel(_pdf(t=[1, 2]))
    with pytest.raises(NotImplementedError):
        be.join(l, r, "", "")


def test_join_on_masked_relation_unsupported(be):
    l = be.filter_eq(be.input_rel(_pdf(k=[1])), "k", 1)
    r = be.input_rel(_pdf(k=[1]))
    with pytest.raises(NotImplementedError):
        be.join(l, r, "k", "k")


@pytest.mark.parametrize("presorted", [True, False])
def test_distinct_count_paths(be, presorted):
    r = be.input_rel(_pdf(c=[1, 1, 2, 3, 3, 3]))
    out = be.reveal(be.distinct_count(r, "c", "dc", input_sorted=presorted))
    assert out["dc"].iloc[0] == 3


def test_sort_and_limit(be):
    r = be.input_rel(_pdf(k=[3, 1, 2], v=[30, 10, 20]))
    s = be.sort_by(r, "k", ascending=True)
    out = be.reveal(be.limit(s, 2))
    np.testing.assert_array_equal(out["k"], [1, 2])
    np.testing.assert_array_equal(out["v"], [10, 20])


def test_shuffle_reorder_select(be):
    r = be.input_rel(_pdf(a=[1, 2, 3, 4]))
    sh = be.shuffle(r)
    assert sorted(be.reveal(sh)["a"]) == [1, 2, 3, 4]
    ro = be.reorder_public(r, np.array([3, 2, 1, 0]))
    np.testing.assert_array_equal(be.reveal(ro)["a"], [4, 3, 2, 1])
    sel = be.select_rows(r, np.array([0, 0, 2]))
    np.testing.assert_array_equal(be.reveal(sel)["a"], [1, 1, 3])


def test_reveal_col_to_charges_less_than_full_reveal(be):
    r = be.input_rel(_pdf(a=np.arange(100), b=np.arange(100)))
    b0 = be.vm.meter.bytes_sent
    be.reveal_col_to(r, "a", "p0")
    single = be.vm.meter.bytes_sent - b0
    b1 = be.vm.meter.bytes_sent
    be.reveal(r)
    full = be.vm.meter.bytes_sent - b1
    assert single < full


def test_input_rejects_non_integer(be):
    with pytest.raises(TypeError):
        be.input_rel(pd.DataFrame({"x": [1.5]}))


# ------------------------------------------------------------- oblivc-sim
@pytest.fixture()
def gc() -> OblivcBackend:
    return OblivcBackend(Meter())


def test_gc_adapter_roundtrip(gc):
    pdf = _pdf(a=[1, 2], b=[3, 4])
    out = gc.reveal(gc.input_rel(pdf))
    pd.testing.assert_frame_equal(out, pdf)


def test_gc_adapter_filter_and_reveal(gc):
    r = gc.filter_eq(gc.input_rel(_pdf(a=[1, 2, 1])), "a", 1)
    out = gc.reveal(r)
    np.testing.assert_array_equal(out["a"], [1, 1])


def test_gc_adapter_aggregate_count(gc):
    r = gc.input_rel(_pdf(k=[1, 1, 2]))
    out = gc.aggregate(r, ["k"], "count", None, "c").pdf.sort_values("k")
    np.testing.assert_array_equal(out["c"], [2, 1])


def test_gc_adapter_scalar_sum(gc):
    r = gc.input_rel(_pdf(v=[1, 2, 3]))
    out = gc.aggregate(r, [], "sum", "v", "s")
    assert out.pdf["s"].iloc[0] == 6


def test_gc_adapter_sort_and_limit(gc):
    r = gc.input_rel(_pdf(k=[1, 3, 2]))
    out = gc.limit(gc.sort_by(r, "k", ascending=False), 2)
    np.testing.assert_array_equal(out.pdf["k"], [3, 2])


def test_gc_adapter_arith_unsupported(gc):
    r = gc.input_rel(_pdf(a=[1]))
    with pytest.raises(NotImplementedError):
        gc.arith(r, "b", "a", "*", 2)


def test_gc_adapter_distinct_count(gc):
    r = gc.input_rel(_pdf(c=[5, 5, 6]))
    out = gc.distinct_count(r, "c", "dc", input_sorted=True)
    assert out.pdf["dc"].iloc[0] == 2
