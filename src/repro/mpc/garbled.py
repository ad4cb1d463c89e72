"""A real Yao garbled-circuit engine (free-XOR + point-and-permute).

This is the cryptographic core of the Obliv-C/ObliVM substrate. It
garbles :class:`~repro.mpc.circuits.Circuit` objects honestly:

* every wire *w* gets a random 128-bit label ``L_w`` for value 0; the
  value-1 label is ``L_w ⊕ R`` for a global offset ``R`` with lsb 1
  (free-XOR, Kolesnikov–Schneider);
* XOR gates are free (out label = XOR of input labels); NOT gates are a
  relabeling by ``R``;
* AND gates carry a 4-row garbled table, permuted by the labels' select
  bits (point-and-permute), each row ``H(A, B, gate_id) ⊕ C``;
* the hash is keyed BLAKE2b (a PRF in the random-oracle style standard
  for GC constructions).

The evaluator sees one label per wire and the tables, and learns nothing
but the decoded outputs — asserted in tests by checking the evaluator's
labels are exactly one of the two valid labels and that transcripts for
different inputs are indistinguishable in size/structure.

Gate-by-gate garbling in Python runs ~10⁴–10⁵ gates/s, so the engine is
used directly in unit tests and small demos; the bulk relational backend
(:mod:`repro.mpc.gc_backend`) charges costs from the same circuits.
"""
from __future__ import annotations

import hashlib
import secrets
from dataclasses import dataclass

from .circuits import Circuit

LABEL_BYTES = 16


def _hash(a: bytes, b: bytes, gate_id: int) -> bytes:
    return hashlib.blake2b(
        a + b + gate_id.to_bytes(8, "little"), digest_size=LABEL_BYTES
    ).digest()


def _xor(a: bytes, b: bytes) -> bytes:
    return bytes(x ^ y for x, y in zip(a, b))


def _lsb(label: bytes) -> int:
    return label[0] & 1


@dataclass
class GarbledCircuit:
    """The material the garbler sends: tables + output decode info."""

    circuit: Circuit
    tables: dict[int, list[bytes]]  # gate index -> 4 permuted rows
    output_decode: dict[int, int]   # output wire -> select bit of label-0


class Garbler:
    """Garbles a circuit and encodes cleartext inputs into wire labels."""

    def __init__(self, circuit: Circuit, rng=secrets):
        self.circuit = circuit
        # global free-XOR offset, lsb forced to 1 so select bits differ
        r = bytearray(rng.token_bytes(LABEL_BYTES))
        r[0] |= 1
        self.R = bytes(r)
        self.zero_labels: dict[int, bytes] = {}
        for w in range(circuit.n_inputs):
            self.zero_labels[w] = rng.token_bytes(LABEL_BYTES)
        self.garbled = self._garble(rng)

    def _label(self, w: int, v: int) -> bytes:
        z = self.zero_labels[w]
        return z if v == 0 else _xor(z, self.R)

    def _garble(self, rng) -> GarbledCircuit:
        tables: dict[int, list[bytes]] = {}
        for gi, (op, a, b, out) in enumerate(self.circuit.gates):
            if op == "XOR":
                self.zero_labels[out] = _xor(self.zero_labels[a], self.zero_labels[b])
            elif op == "NOT":
                self.zero_labels[out] = _xor(self.zero_labels[a], self.R)
            elif op == "AND":
                self.zero_labels[out] = rng.token_bytes(LABEL_BYTES)
                rows: list[bytes | None] = [None] * 4
                for va in (0, 1):
                    for vb in (0, 1):
                        la, lb = self._label(a, va), self._label(b, vb)
                        pos = (_lsb(la) << 1) | _lsb(lb)
                        rows[pos] = _xor(
                            _hash(la, lb, gi), self._label(out, va & vb)
                        )
                tables[gi] = rows  # type: ignore[assignment]
            else:  # pragma: no cover
                raise ValueError(op)
        decode = {w: _lsb(self.zero_labels[w]) for w in self.circuit.outputs}
        return GarbledCircuit(self.circuit, tables, decode)

    def encode_inputs(self, input_bits: list[int]) -> dict[int, bytes]:
        """Wire labels for the given cleartext input assignment. (In a
        real 2PC the evaluator's labels arrive via oblivious transfer;
        the OT is out of scope — its cost is charged by the backend.)"""
        if len(input_bits) != self.circuit.n_inputs:
            raise ValueError("input width mismatch")
        return {w: self._label(w, v) for w, v in enumerate(input_bits)}


def evaluate_garbled(
    gc: GarbledCircuit, input_labels: dict[int, bytes]
) -> tuple[list[int], dict[int, bytes]]:
    """The evaluator's computation: one label per wire, no values.

    Returns (decoded output bits, all wire labels seen) — the labels are
    returned so tests can assert the evaluator never holds both labels.
    """
    labels = dict(input_labels)
    for gi, (op, a, b, out) in enumerate(gc.circuit.gates):
        if op == "XOR":
            labels[out] = _xor(labels[a], labels[b])
        elif op == "NOT":
            labels[out] = labels[a]  # relabeled by R on the garbler side
            # NOT under free-XOR: evaluator's label is unchanged; the
            # *meaning* flips because zero-label was offset by R.
        elif op == "AND":
            la, lb = labels[a], labels[b]
            row = gc.tables[gi][(_lsb(la) << 1) | _lsb(lb)]
            labels[out] = _xor(_hash(la, lb, gi), row)
        else:  # pragma: no cover
            raise ValueError(op)
    outs = [gc.output_decode[w] ^ _lsb(labels[w]) for w in gc.circuit.outputs]
    return outs, labels


def run_two_party(
    circuit: Circuit, garbler_bits: list[int], evaluator_bits: list[int]
) -> list[int]:
    """End-to-end 2-party execution: first ``len(garbler_bits)`` circuit
    inputs belong to the garbler, the rest to the evaluator."""
    bits = garbler_bits + evaluator_bits
    g = Garbler(circuit)
    labels = g.encode_inputs(bits)
    outs, _ = evaluate_garbled(g.garbled, labels)
    return outs
