"""MPC relational operators over secret-shared relations.

These implement the sub-protocols the paper's operators rely on (§5.3,
§5.4, §6):

* oblivious shuffle (resharing-based permutation),
* oblivious sort — a real Batcher odd-even mergesort network executed
  with oblivious compare-exchanges (``lt`` + Beaver multiplications),
* sort-based grouped aggregation (Jónsson et al. [39]) with an oblivious
  segmented log-scan,
* Cartesian-product join (the paper's standard MPC join, O(n·m)
  nonlinear operations; leaks output size, as the paper's Sharemind
  baseline does),
* oblivious indexing ("select", Laud [45]) used by the hybrid join,
* oblivious filtering and distinct-count.

All operators take the :class:`SecretSharingVM` whose meter accumulates
the communication they would cost in a real deployment.
"""
from __future__ import annotations

from typing import Callable

import numpy as np
import pandas as pd

from .secret_sharing import SecretSharingVM, SharedVector, _from_ring
from .shared_rel import SharedRelation

_SENTINEL = np.int64(2**62)  # sort padding key, larger than any data value


# ----------------------------------------------------------------- shuffle
def oblivious_shuffle(
    vm: SecretSharingVM, rel: SharedRelation, rng: np.random.Generator
) -> tuple[SharedRelation, np.ndarray]:
    """Obliviously shuffle all columns with one hidden permutation.

    Returns the shuffled relation and the permutation (held by the
    simulation driver only — no party learns it)."""
    perm = rng.permutation(rel.n_rows)
    return (
        SharedRelation(
            {n: vm.oblivious_permute(v, perm) for n, v in rel.columns.items()}
        ),
        perm,
    )


# -------------------------------------------------------------------- sort
from functools import lru_cache


@lru_cache(maxsize=4)
def _batcher_pairs_cached(n: int) -> tuple[tuple[np.ndarray, np.ndarray], ...]:
    """Cached layer list — network generation is pure-Python and O(n log² n),
    so repeated sorts at the same size shouldn't regenerate it."""
    return tuple(_batcher_pairs_gen(n))


def _batcher_pairs(n: int):
    return _batcher_pairs_cached(n)


def _batcher_pairs_gen(n: int):
    """Compare-exchange layers of Batcher's odd-even mergesort for n a
    power of two. Yields (i_idx, j_idx) index arrays per layer."""
    p = 1
    while p < n:
        k = p
        while k >= 1:
            i_list, j_list = [], []
            for j in range(k % p, n - k, 2 * k):
                for i in range(min(k, n - j - k)):
                    if (i + j) // (2 * p) == (i + j + k) // (2 * p):
                        i_list.append(i + j)
                        j_list.append(i + j + k)
            if i_list:
                yield np.array(i_list), np.array(j_list)
            k //= 2
        p *= 2


def oblivious_sort(
    vm: SecretSharingVM,
    rel: SharedRelation,
    key: str,
    *,
    descending: bool = False,
) -> SharedRelation:
    """Sort a shared relation by one column with a Batcher network of
    oblivious compare-exchanges: O(n log² n) comparisons, each followed by
    two Beaver multiplications per column to swap conditionally."""
    n = rel.n_rows
    if n <= 1:
        return rel
    n2 = 1 << (n - 1).bit_length()
    cols = dict(rel.columns)
    if n2 != n:
        pad_key = np.full(n2 - n, _SENTINEL if not descending else -_SENTINEL)
        for name, v in cols.items():
            pad = vm.share(pad_key if name == key else np.zeros(n2 - n, np.int64))
            cols[name] = vm.concat([v, pad])
    names = list(cols)
    shares = {name: cols[name] for name in names}
    for i_idx, j_idx in _batcher_pairs(n2):
        ki = vm.take(shares[key], i_idx)
        kj = vm.take(shares[key], j_idx)
        # swap if out of order
        swap = vm.lt(kj, ki) if not descending else vm.lt(ki, kj)
        for name in names:
            vi = vm.take(shares[name], i_idx)
            vj = vm.take(shares[name], j_idx)
            delta = vm.mul(swap, vm.sub(vj, vi))
            new_i = vm.add(vi, delta)
            new_j = vm.sub(vj, delta)
            merged = [s.copy() for s in shares[name].shares]
            for p in range(len(merged)):
                merged[p][i_idx] = new_i.shares[p]
                merged[p][j_idx] = new_j.shares[p]
            shares[name] = SharedVector(tuple(merged))
    out = SharedRelation({name: vm.take(shares[name], slice(0, n)) for name in names})
    return out


# ------------------------------------------------------ segmented log-scan
def segmented_scan_sum(
    vm: SecretSharingVM, vals: SharedVector, same_seg: SharedVector
) -> SharedVector:
    """Inclusive segmented prefix sum (Hillis–Steele, O(log n) levels of
    vectorized Beaver muls). ``same_seg[i] = [row i is in the same segment
    as row i-1]`` (``same_seg[0] = 0``)."""
    n = len(vals)
    v, f = vals, same_seg
    d = 1
    while d < n:
        # candidate = v[i] + f[i..] * v[i-d]  restricted to i >= d
        idx_hi = np.arange(d, n)
        idx_lo = np.arange(0, n - d)
        v_hi, v_lo = vm.take(v, idx_hi), vm.take(v, idx_lo)
        f_hi, f_lo = vm.take(f, idx_hi), vm.take(f, idx_lo)
        v_new = vm.add(v_hi, vm.mul(f_hi, v_lo))
        f_new = vm.mul(f_hi, f_lo)
        v_sh = [s.copy() for s in v.shares]
        f_sh = [s.copy() for s in f.shares]
        for p in range(len(v_sh)):
            v_sh[p][idx_hi] = v_new.shares[p]
            f_sh[p][idx_hi] = f_new.shares[p]
        v, f = SharedVector(tuple(v_sh)), SharedVector(tuple(f_sh))
        d *= 2
    return v


def segmented_scan_or(
    vm: SecretSharingVM, bits: SharedVector, same_seg: SharedVector
) -> SharedVector:
    """Inclusive segmented prefix OR over shared 0/1 values."""
    n = len(bits)
    v, f = bits, same_seg
    d = 1
    while d < n:
        idx_hi = np.arange(d, n)
        idx_lo = np.arange(0, n - d)
        v_hi, v_lo = vm.take(v, idx_hi), vm.take(v, idx_lo)
        f_hi, f_lo = vm.take(f, idx_hi), vm.take(f, idx_lo)
        carried = vm.mul(f_hi, v_lo)  # OR contribution from the left
        # or(a, b) = a + b - a*b
        v_new = vm.sub(vm.add(v_hi, carried), vm.mul(v_hi, carried))
        f_new = vm.mul(f_hi, f_lo)
        v_sh = [s.copy() for s in v.shares]
        f_sh = [s.copy() for s in f.shares]
        for p in range(len(v_sh)):
            v_sh[p][idx_hi] = v_new.shares[p]
            f_sh[p][idx_hi] = f_new.shares[p]
        v, f = SharedVector(tuple(v_sh)), SharedVector(tuple(f_sh))
        d *= 2
    return v


def _same_key_flags(vm: SecretSharingVM, key: SharedVector) -> SharedVector:
    """same[i] = [key[i] == key[i-1]] (shared), same[0] = 0."""
    n = len(key)
    if n == 1:
        return vm.share(np.zeros(1, np.int64))
    inner = vm.eq(vm.take(key, np.arange(1, n)), vm.take(key, np.arange(0, n - 1)))
    zero = vm.share(np.zeros(1, np.int64))
    return vm.concat([zero, inner])


# ------------------------------------------------------------- aggregation
def aggregate_sum_by_key(
    vm: SecretSharingVM,
    rel: SharedRelation,
    key: str,
    value: str,
    rng: np.random.Generator,
    *,
    input_sorted: bool = False,
) -> SharedRelation:
    """Sort-based grouped SUM (Jónsson et al.): sort by key, obliviously
    accumulate each group into its last row, shuffle, reveal group-end
    flags, keep group ends. Leaks the number of distinct keys (the paper's
    protocol does not pad either, §7.4 comorbidity).

    With ``input_sorted=True`` the oblivious sort is skipped — the §5.4
    sort-elimination optimization."""
    work = rel.project([key, value])
    if not input_sorted and work.n_rows > 1:
        work = oblivious_sort(vm, work, key)
    same = _same_key_flags(vm, work.columns[key])
    sums = segmented_scan_sum(vm, work.columns[value], same)
    n = work.n_rows
    # group end: next row starts a new group (or last row)
    if n > 1:
        next_same = vm.concat(
            [vm.take(same, np.arange(1, n)), vm.share(np.zeros(1, np.int64))]
        )
    else:
        next_same = vm.share(np.zeros(1, np.int64))
    one = vm.share(np.ones(n, np.int64))
    is_end = vm.sub(one, next_same)
    staged = SharedRelation(
        {key: work.columns[key], value: sums, "__end": is_end}
    )
    shuffled, _ = oblivious_shuffle(vm, staged, rng)
    flags = vm.reveal(shuffled.columns["__end"])
    keep = np.nonzero(flags == 1)[0]
    return SharedRelation(
        {
            key: vm.take(shuffled.columns[key], keep),
            value: vm.take(shuffled.columns[value], keep),
        }
    )


def aggregate_sum_total(
    vm: SecretSharingVM, rel: SharedRelation, value: str
) -> SharedRelation:
    """Ungrouped SUM — share-local additions, no communication."""
    return SharedRelation({value: vm.sum(rel.columns[value])})


# -------------------------------------------------------------------- join
def join_cartesian(
    vm: SecretSharingVM,
    left: SharedRelation,
    right: SharedRelation,
    left_key: str,
    right_key: str,
    rng: np.random.Generator,
) -> SharedRelation:
    """Standard MPC join: O(n·m) oblivious equality tests over the
    Cartesian product, then oblivious selection of the matching rows.

    Cost model: the all-pairs equality flags are charged as an ABB batch
    of n·m comparisons (the dominant cost that makes Figure 1b/6
    quadratic); the matching pairs are then fetched with the oblivious
    indexing protocol. Output size is leaked (as in the paper's Sharemind
    baseline join, §7.3)."""
    n, m = left.n_rows, right.n_rows
    # memory for the n·m pair flags (one ring word per share per pair)
    vm.meter.charge_memory(
        "mpc cartesian join pair flags", float(n) * m * 8 * vm.n_parties
    )
    # ABB: the equality-flag batch. Computed via a cleartext index match
    # internally; charged at full O(n·m) comparison cost.
    lk = _from_ring(vm._reconstruct_ring(left.columns[left_key]))
    rk = _from_ring(vm._reconstruct_ring(right.columns[right_key]))
    vm._abb(np.zeros(0, np.int64), rounds=8, words_per_elem=5, n_elems=n * m)
    li, ri = np.nonzero(lk[:, None] == rk[None, :])
    out: dict[str, SharedVector] = {left_key: vm.gather(left.columns[left_key], li)}
    for name, v in left.columns.items():
        if name != left_key:
            out[name] = vm.gather(v, li)
    for name, v in right.columns.items():
        if name != right_key:
            out[name] = vm.gather(v, ri)
    joined = SharedRelation(out)
    shuffled, _ = oblivious_shuffle(vm, joined, rng) if joined.n_rows else (joined, None)
    return shuffled


def select_by_public_index(
    vm: SecretSharingVM, rel: SharedRelation, idx: np.ndarray
) -> SharedRelation:
    """Oblivious indexing (hybrid join step 6): the indexes were produced
    by the STP over *shuffled* row identities, so applying them is charged
    as the Laud-style select protocol."""
    return SharedRelation({n: vm.gather(v, idx) for n, v in rel.columns.items()})


# ------------------------------------------------------------------ filter
def filter_eq_flags(
    vm: SecretSharingVM, col: SharedVector, constant: int
) -> SharedVector:
    """Shared 0/1 flags [col == constant] for a public constant."""
    n = len(col)
    const = vm.share(np.full(n, constant, np.int64))
    return vm.eq(col, const)


def apply_filter_oblivious(
    vm: SecretSharingVM, rel: SharedRelation, flags: SharedVector
) -> SharedRelation:
    """Zero out non-matching rows (size-preserving oblivious filter)."""
    return SharedRelation(
        {n: vm.mul(v, flags) for n, v in rel.columns.items()}
    )


# ----------------------------------------------------------- distinct count
def distinct_count_sorted(
    vm: SecretSharingVM,
    key: SharedVector,
    mask: SharedVector | None = None,
) -> SharedVector:
    """Count distinct key values (optionally only among rows with
    ``mask=1``) given the relation is already sorted by ``key`` — the
    post-sort-elimination form used by the aspirin-count query.

    distinct = Σ_i mask_i · (1 − prefixOR of mask over earlier same-key
    rows); all operations are vectorized oblivious arithmetic."""
    n = len(key)
    same = _same_key_flags(vm, key)
    if mask is None:
        one = vm.share(np.ones(n, np.int64))
        # first row of each group contributes 1
        contrib = vm.sub(one, same)
        return vm.sum(contrib)
    scan = segmented_scan_or(vm, mask, same)
    # seen-before(i) = OR of mask over earlier rows in the segment
    # = (scan shifted by one within segment) = same[i] * scan[i-1]
    if n > 1:
        shifted = vm.concat(
            [vm.share(np.zeros(1, np.int64)), vm.take(scan, np.arange(0, n - 1))]
        )
    else:
        shifted = vm.share(np.zeros(1, np.int64))
    seen_before = vm.mul(same, shifted)
    one = vm.share(np.ones(n, np.int64))
    contrib = vm.mul(mask, vm.sub(one, seen_before))
    return vm.sum(contrib)


# ------------------------------------------------------------------- limit
def top_k_by(
    vm: SecretSharingVM,
    rel: SharedRelation,
    key: str,
    k: int,
) -> SharedRelation:
    """ORDER BY key DESC LIMIT k under MPC: oblivious sort descending,
    then take the first k rows (positions are public)."""
    sorted_rel = oblivious_sort(vm, rel, key, descending=True)
    k = min(k, sorted_rel.n_rows)
    return SharedRelation(
        {n: vm.take(v, slice(0, k)) for n, v in sorted_rel.columns.items()}
    )
