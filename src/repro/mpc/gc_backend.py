"""Garbled-circuit relational backend (the Obliv-C / ObliVM substrate).

Executes relational operators "under 2-party garbled circuits": results
are computed semantically (bit-for-bit what the circuits in
:mod:`repro.mpc.circuits` compute), while **time** is charged from the
exact AND-gate counts of those circuits and **memory** from retained
wire-label state. Exceeding the simulated VM's memory cap raises
:class:`~repro.mpc.accounting.SimulatedOOM` — reproducing the paper's
"Obliv-C runs out of memory at 30k records (join) / 300k (projection)"
observations (§2.3).

Calibration constants (documented in DESIGN.md §2.1):

* ``bit_width=32`` — Obliv-C's default obliv int;
* ``WIRE_BYTES=64`` — 16-byte labels × 4 for allocator/bookkeeping
  overhead, calibrated so the OOM thresholds land in the paper's regime;
* input staging holds 3 label copies (garbler's two + evaluator's one).
"""
from __future__ import annotations

import math
from dataclasses import dataclass

import numpy as np
import pandas as pd

from .accounting import GC_LABEL_BYTES, Meter
from .circuits import gate_counts

WIRE_BYTES = 4 * GC_LABEL_BYTES
#: Bytes moved per evaluator input bit (oblivious transfer, ~3 labels).
OT_BYTES_PER_BIT = 3 * GC_LABEL_BYTES


def batcher_comparators(n: int) -> float:
    """Closed-form comparator count of Batcher's odd-even mergesort,
    ≈ (n/4)·log₂n·(log₂n + 1)."""
    if n <= 1:
        return 0.0
    k = math.log2(max(2, n))
    return (n / 4.0) * k * (k + 1)


@dataclass
class GCRelation:
    """A relation held inside the garbled computation.

    ``pdf`` is the semantic value (what the circuit wires encode); all
    columns are int64. ``live_bits`` is the wire state the engine keeps
    for it."""

    pdf: pd.DataFrame

    @property
    def n_rows(self) -> int:
        return len(self.pdf)

    @property
    def n_cols(self) -> int:
        return len(self.pdf.columns)


class GCBackend:
    """One 2-party garbled-circuit session with metered cost."""

    def __init__(self, meter: Meter, *, bit_width: int = 32):
        self.meter = meter
        self.k = bit_width

    # ------------------------------------------------------------ helpers
    def _bits(self, n_rows: int, n_cols: int) -> float:
        return float(n_rows) * n_cols * self.k

    def _charge_live(self, what: str, bits: float) -> None:
        self.meter.charge_memory(what, bits * WIRE_BYTES)

    # -------------------------------------------------------------- input
    def input_relation(self, pdf: pd.DataFrame) -> GCRelation:
        """Encode a cleartext relation into wire labels (garbler side) /
        receive labels via OT (evaluator side)."""
        pdf = pdf.reset_index(drop=True).astype(np.int64)
        bits = self._bits(len(pdf), len(pdf.columns))
        self._charge_live("gc input staging", bits * 3)
        self.meter.charge_comm(rounds=1, bytes_sent=bits * OT_BYTES_PER_BIT)
        return GCRelation(pdf)

    def reveal(self, rel: GCRelation) -> pd.DataFrame:
        """Decode output wires to cleartext (sends decode bits)."""
        self.meter.charge_comm(
            rounds=1, bytes_sent=self._bits(rel.n_rows, rel.n_cols) / 8
        )
        return rel.pdf.copy()

    # ---------------------------------------------------------- operators
    def project(self, rel: GCRelation, cols: list[str]) -> GCRelation:
        """Projection: wire rewiring only (no ANDs), but the full input
        must be staged — this is what OOMs Obliv-C at ~300k records."""
        self._charge_live(
            "gc project",
            self._bits(rel.n_rows, rel.n_cols) * 3
            + self._bits(rel.n_rows, len(cols)),
        )
        return GCRelation(rel.pdf[cols].copy())

    def filter_eq(self, rel: GCRelation, col: str, const: int) -> GCRelation:
        """Oblivious filter: eq-compare each row against the constant.
        Size-preserving in the real circuit; the mask is tracked
        semantically by zeroing non-matching rows' payloads."""
        eq_and, _ = gate_counts("eq", self.k)
        n = rel.n_rows
        self.meter.charge_gates(and_gates=n * eq_and)
        self._charge_live("gc filter", self._bits(n, rel.n_cols + 1))
        mask = (rel.pdf[col].to_numpy() == const).astype(np.int64)
        out = rel.pdf.copy()
        out["__mask"] = (
            mask if "__mask" not in out.columns else mask * out["__mask"].to_numpy()
        )
        return GCRelation(out)

    def join(
        self, left: GCRelation, right: GCRelation, lk: str, rk: str
    ) -> GCRelation:
        """Cartesian-product join: n·m equality circuits plus muxes for
        the output columns. The n·m match flags are retained wire state —
        this is what OOMs Obliv-C at ~30k records."""
        n, m = left.n_rows, right.n_rows
        eq_and, _ = gate_counts("eq", self.k)
        mux_and, _ = gate_counts("mux", self.k)
        out_cols = left.n_cols + right.n_cols - 1
        self._charge_live(
            "gc join pair flags",
            float(n) * m + self._bits(n, left.n_cols) + self._bits(m, right.n_cols),
        )
        self.meter.charge_gates(and_gates=float(n) * m * (eq_and + mux_and * out_cols))
        merged = left.pdf.merge(right.pdf, left_on=lk, right_on=rk)
        if rk != lk and rk in merged.columns:
            merged = merged.drop(columns=[rk])
        if "__mask_x" in merged.columns:
            merged["__mask"] = merged.pop("__mask_x") * merged.pop("__mask_y")
        return GCRelation(merged.reset_index(drop=True))

    def agg_sum_by_key(
        self, rel: GCRelation, key: str, value: str, *, presorted: bool = False
    ) -> GCRelation:
        """Sort-based grouped sum (Jónsson et al. in circuits): a Batcher
        sorting network over (key,value) records, then a linear oblivious
        scan of eq + add + mux. Output is unpadded (leaks group count),
        matching SMCQL/Conclave behaviour (§7.4)."""
        n = rel.n_rows
        eq_and, _ = gate_counts("eq", self.k)
        add_and, _ = gate_counts("add", self.k)
        mux_and, _ = gate_counts("mux", self.k)
        swap_and, _ = gate_counts("cmp_swap", 2 * self.k)
        gates = n * (eq_and + add_and + 2 * mux_and)
        if not presorted:
            gates += batcher_comparators(n) * swap_and
        self.meter.charge_gates(and_gates=gates)
        self._charge_live("gc aggregation", self._bits(n, 3) * 2)
        pdf = rel.pdf
        if "__mask" in pdf.columns:
            pdf = pdf[pdf["__mask"] == 1].drop(columns="__mask")
        out = pdf.groupby(key, as_index=False)[value].sum()
        return GCRelation(out.reset_index(drop=True))

    def distinct_count(self, rel: GCRelation, col: str, *, presorted: bool = False) -> int:
        """COUNT(DISTINCT col) (over mask=1 rows if filtered): sort
        network + eq-scan + counter adds."""
        n = rel.n_rows
        eq_and, _ = gate_counts("eq", self.k)
        add_and, _ = gate_counts("add", self.k)
        swap_and, _ = gate_counts("cmp_swap", self.k)
        gates = n * (eq_and + add_and)
        if not presorted:
            gates += batcher_comparators(n) * swap_and
        self.meter.charge_gates(and_gates=gates)
        self._charge_live("gc distinct", self._bits(n, 2))
        pdf = rel.pdf
        if "__mask" in pdf.columns:
            pdf = pdf[pdf["__mask"] == 1]
        return int(pdf[col].nunique())

    def top_k_by(self, rel: GCRelation, key: str, k: int) -> GCRelation:
        """ORDER BY key DESC LIMIT k: full sorting network, reveal first
        k positions."""
        n = rel.n_rows
        swap_and, _ = gate_counts("cmp_swap", 2 * self.k)
        self.meter.charge_gates(and_gates=batcher_comparators(n) * swap_and)
        self._charge_live("gc sort", self._bits(n, rel.n_cols) * 2)
        out = rel.pdf.sort_values(key, ascending=False, kind="stable").head(k)
        return GCRelation(out.reset_index(drop=True))
