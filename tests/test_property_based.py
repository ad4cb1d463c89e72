"""Property-based tests (hypothesis) for the MPC substrates: algebraic
laws of the secret-sharing VM, sorting-network correctness on arbitrary
inputs, and garbled-vs-cleartext circuit agreement."""
import numpy as np
import pandas as pd
from hypothesis import given, settings, strategies as st

from repro.mpc import circuits as C
from repro.mpc import protocols as P
from repro.mpc.accounting import Meter
from repro.mpc.garbled import Garbler, evaluate_garbled
from repro.mpc.secret_sharing import SecretSharingVM
from repro.mpc.shared_rel import reveal_relation, share_dataframe

_vals = st.lists(
    st.integers(min_value=-(2**40), max_value=2**40), min_size=1, max_size=40
)


def _vm(seed=0):
    return SecretSharingVM(3, Meter(), seed=seed)


@settings(max_examples=30, deadline=None)
@given(_vals, st.integers(0, 2**31))
def test_share_reveal_identity(vals, seed):
    vm = _vm(seed % 1000)
    x = np.array(vals, dtype=np.int64)
    np.testing.assert_array_equal(vm.reveal(vm.share(x)), x)


@settings(max_examples=30, deadline=None)
@given(_vals)
def test_addition_homomorphism(vals):
    vm = _vm(1)
    x = np.array(vals, dtype=np.int64)
    a, b = vm.share(x), vm.share(x[::-1].copy())
    np.testing.assert_array_equal(vm.reveal(vm.add(a, b)), x + x[::-1])


@settings(max_examples=30, deadline=None)
@given(_vals)
def test_beaver_mul_matches_numpy(vals):
    vm = _vm(2)
    x = np.array(vals, dtype=np.int64) % 100_000
    a, b = vm.share(x), vm.share((x + 3) % 100_000)
    np.testing.assert_array_equal(
        vm.reveal(vm.mul(a, b)), x * ((x + 3) % 100_000)
    )


@settings(max_examples=25, deadline=None)
@given(st.lists(st.integers(-1000, 1000), min_size=1, max_size=33))
def test_oblivious_sort_sorts_anything(keys):
    vm = _vm(3)
    rel = share_dataframe(
        vm, pd.DataFrame({"k": np.array(keys, np.int64),
                          "v": np.arange(len(keys), dtype=np.int64)})
    )
    got = reveal_relation(vm, P.oblivious_sort(vm, rel, "k"))
    assert got["k"].tolist() == sorted(keys)
    assert set(zip(got["k"], got["v"])) == set(
        zip(keys, range(len(keys)))
    )


@settings(max_examples=25, deadline=None)
@given(
    st.lists(st.tuples(st.integers(0, 5), st.integers(-50, 50)),
             min_size=1, max_size=30)
)
def test_grouped_sum_matches_pandas(rows):
    vm = _vm(4)
    pdf = pd.DataFrame(rows, columns=["k", "v"]).astype(np.int64)
    rel = share_dataframe(vm, pdf)
    got = reveal_relation(
        vm, P.aggregate_sum_by_key(vm, rel, "k", "v", np.random.default_rng(4))
    ).sort_values("k").reset_index(drop=True)
    expected = pdf.groupby("k", as_index=False)["v"].sum()
    pd.testing.assert_frame_equal(got, expected, check_dtype=False)


@settings(max_examples=25, deadline=None)
@given(st.lists(st.integers(0, 8), min_size=1, max_size=25))
def test_distinct_count_matches_set(keys):
    vm = _vm(5)
    arr = np.sort(np.array(keys, np.int64))
    cnt = vm.reveal(P.distinct_count_sorted(vm, vm.share(arr)))[0]
    assert cnt == len(set(keys))


@settings(max_examples=15, deadline=None)
@given(st.integers(0, 255), st.integers(0, 255))
def test_garbled_eq_all_byte_pairs(x, y):
    b = C.Builder()
    circ = C.BUILDERS["eq"](b, 8)
    g = Garbler(circ)
    bits = C.int_to_bits(x, 8) + C.int_to_bits(y, 8)
    got, _ = evaluate_garbled(g.garbled, g.encode_inputs(bits))
    assert got == [int(x == y)]


@settings(max_examples=15, deadline=None)
@given(st.integers(0, 2**16 - 1), st.integers(0, 2**16 - 1))
def test_garbled_add_16bit(x, y):
    b = C.Builder()
    circ = C.BUILDERS["add"](b, 16)
    g = Garbler(circ)
    bits = C.int_to_bits(x, 16) + C.int_to_bits(y, 16)
    got, _ = evaluate_garbled(g.garbled, g.encode_inputs(bits))
    assert C.bits_to_int(got) == (x + y) % (1 << 16)
