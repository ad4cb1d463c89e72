"""Tests for the Obliv-C/ObliVM relational backend (semantics + cost model)."""
import numpy as np
import pandas as pd
import pytest

from repro.mpc.accounting import Meter, SimulatedOOM
from repro.mpc.gc_backend import GCBackend, GCRelation, batcher_comparators


def _backend(cap_bytes=None, rate=10e6) -> GCBackend:
    m = Meter(gc_gates_per_second=rate)
    if cap_bytes is not None:
        m.memory_cap_bytes = cap_bytes
    return GCBackend(m)


def _rel(backend, **cols) -> GCRelation:
    return backend.input_relation(
        pd.DataFrame({k: np.asarray(v, np.int64) for k, v in cols.items()})
    )


def test_input_and_reveal_roundtrip():
    be = _backend()
    rel = _rel(be, a=[1, 2, 3], b=[4, 5, 6])
    out = be.reveal(rel)
    np.testing.assert_array_equal(out["a"], [1, 2, 3])
    assert be.meter.bytes_sent > 0  # OT for inputs


def test_project_semantics_and_charges_memory():
    be = _backend()
    rel = _rel(be, a=[1, 2], b=[3, 4], c=[5, 6])
    out = be.project(rel, ["c", "a"])
    assert list(out.pdf.columns) == ["c", "a"]
    assert be.meter.peak_mem_bytes > 0


def test_project_simulated_oom():
    be = _backend(cap_bytes=1 << 16)
    rel = GCRelation(pd.DataFrame({"a": np.arange(100000, dtype=np.int64)}))
    with pytest.raises(SimulatedOOM):
        be.project(rel, ["a"])


def test_join_matches_pandas():
    be = _backend()
    g = np.random.default_rng(3)
    l = pd.DataFrame({"k": g.integers(0, 8, 25), "a": np.arange(25)}).astype(np.int64)
    r = pd.DataFrame({"k": g.integers(0, 8, 15), "b": np.arange(15)}).astype(np.int64)
    out = be.join(be.input_relation(l), be.input_relation(r), "k", "k").pdf
    expected = l.merge(r, on="k")
    pd.testing.assert_frame_equal(
        out.sort_values(["k", "a", "b"]).reset_index(drop=True),
        expected.sort_values(["k", "a", "b"]).reset_index(drop=True),
        check_dtype=False,
    )


def test_join_gate_cost_quadratic():
    costs = []
    for n in (50, 100):
        be = _backend()
        l = _rel(be, k=np.arange(n))
        r = _rel(be, k=np.arange(n))
        g0 = be.meter.gc_and_gates
        be.join(l, r, "k", "k")
        costs.append(be.meter.gc_and_gates - g0)
    assert costs[1] > 3.5 * costs[0]


def test_join_simulated_oom_threshold():
    """With the default 8 GiB cap the join must OOM in the tens-of-
    thousands regime (paper: Obliv-C joins OOM at 30k records)."""
    be = _backend()
    n_oom = 40_000
    l = GCRelation(pd.DataFrame({"k": np.zeros(n_oom, np.int64)}))
    r = GCRelation(pd.DataFrame({"k": np.ones(n_oom, np.int64)}))
    with pytest.raises(SimulatedOOM):
        be.join(l, r, "k", "k")
    # but a 5k-record join fits
    be2 = _backend()
    l2 = _rel(be2, k=np.arange(5000))
    r2 = _rel(be2, k=np.arange(5000))
    be2.join(l2, r2, "k", "k")


def test_filter_and_join_mask_propagation():
    be = _backend()
    l = _rel(be, k=[1, 1, 2], a=[10, 11, 12])
    l = be.filter_eq(l, "a", 10)
    r = _rel(be, k=[1, 2], b=[7, 8])
    out = be.join(l, r, "k", "k")
    # mask column survives the join and marks only the a=10 row
    kept = out.pdf[out.pdf["__mask"] == 1]
    assert len(kept) == 1 and kept.iloc[0]["a"] == 10


def test_agg_sum_by_key():
    be = _backend()
    rel = _rel(be, k=[1, 2, 1, 2, 3], v=[10, 20, 30, 40, 50])
    out = be.agg_sum_by_key(rel, "k", "v").pdf.sort_values("k")
    np.testing.assert_array_equal(out["v"], [40, 60, 50])


def test_agg_respects_filter_mask():
    be = _backend()
    rel = _rel(be, k=[1, 1, 2], v=[5, 7, 9], f=[0, 1, 1])
    rel = be.filter_eq(rel, "f", 1)
    out = be.agg_sum_by_key(rel, "k", "v").pdf.sort_values("k")
    np.testing.assert_array_equal(out["v"], [7, 9])


def test_agg_presorted_cheaper():
    gates = []
    for presorted in (False, True):
        be = _backend()
        rel = _rel(be, k=np.sort(np.random.default_rng(1).integers(0, 50, 500)),
                   v=np.ones(500, np.int64))
        g0 = be.meter.gc_and_gates
        be.agg_sum_by_key(rel, "k", "v", presorted=presorted)
        gates.append(be.meter.gc_and_gates - g0)
    assert gates[1] < gates[0] / 2


@pytest.mark.parametrize("presorted", [False, True])
def test_distinct_count(presorted):
    be = _backend()
    rel = _rel(be, c=[3, 1, 3, 2, 2, 3])
    assert be.distinct_count(rel, "c", presorted=presorted) == 3


def test_distinct_count_with_mask():
    be = _backend()
    rel = _rel(be, c=[1, 2, 3], f=[1, 0, 1])
    rel = be.filter_eq(rel, "f", 1)
    assert be.distinct_count(rel, "c") == 2


def test_top_k_by():
    be = _backend()
    rel = _rel(be, k=[1, 2, 3], cnt=[5, 50, 20])
    out = be.top_k_by(rel, "cnt", 2).pdf
    np.testing.assert_array_equal(out["k"], [2, 3])


def test_batcher_comparator_formula():
    assert batcher_comparators(1) == 0
    # growth is n log^2 n-ish: doubling n grows cost by > 2x
    assert batcher_comparators(2048) > 2 * batcher_comparators(1024)


def test_slow_backend_rate_increases_time():
    fast, slow = _backend(rate=10e6), _backend(rate=1e5)
    for be in (fast, slow):
        rel = _rel(be, k=np.arange(2000), v=np.arange(2000))
        be.agg_sum_by_key(rel, "k", "v")
    assert slow.meter.gate_seconds() > 50 * fast.meter.gate_seconds()
