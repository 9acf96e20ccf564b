"""Chimp and Chimp128 XOR compression (Liakos et al., PVLDB 2022).

Chimp refines Gorilla with 2-bit flags and a rounded leading-zero code:

* ``00`` — XOR is zero;
* ``01`` — trailing zeros > 6: 3-bit leading code + 6-bit centre length +
  centre bits (drops the trailing zeros entirely);
* ``10`` — leading count equal to the previous one: ``64 - lead`` bits;
* ``11`` — new leading count: 3-bit leading code + ``64 - lead`` bits.

Chimp128 (the paper's ``ChimpN`` with N=128) additionally picks, among the
previous 128 values, the reference whose XOR has the most trailing zeros
(we scan the window; the original uses a hash on the low bits) and stores
its 7-bit offset in the ``00``/``01`` branches.
"""
from __future__ import annotations

import numpy as np

from ..core.bitstream import BitReader, BitWriter

__all__ = ["ChimpCodec", "Chimp128Codec"]

_MASK64 = (1 << 64) - 1
_ROUND = [0, 8, 12, 16, 18, 20, 22, 24]  # leading-zero rounding table


def _clz64(x: int) -> int:
    return 64 - x.bit_length() if x else 64


def _ctz64(x: int) -> int:
    return (x & -x).bit_length() - 1 if x else 64


def _lead_code(lead: int) -> int:
    """Largest table index whose value is <= lead."""
    code = 0
    for i, v in enumerate(_ROUND):
        if v <= lead:
            code = i
    return code


class ChimpCodec:
    name = "Chimp"
    domain = "bits"

    def compress(self, values: np.ndarray) -> bytes:
        vals = np.asarray(values, dtype=np.uint64)
        w = BitWriter()
        if len(vals) == 0:
            return b""
        prev = int(vals[0])
        w.write(prev, 64)
        lead_prev = -1
        for v in vals[1:]:
            v = int(v)
            xor = (v ^ prev) & _MASK64
            if xor == 0:
                w.write(0b00, 2)
                lead_prev = 65  # sentinel: next '10' cannot match
            else:
                code = _lead_code(_clz64(xor))
                lead = _ROUND[code]
                trail = _ctz64(xor)
                if trail > 6:
                    w.write(0b10, 2)  # flag '01' in paper order; LSB-first here
                    w.write(code, 3)
                    centre = 64 - lead - trail
                    w.write(centre, 6)
                    w.write(xor >> trail, centre)
                    lead_prev = 65
                elif lead == lead_prev:
                    w.write(0b01, 2)
                    w.write(xor, 64 - lead)
                else:
                    w.write(0b11, 2)
                    w.write(code, 3)
                    w.write(xor, 64 - lead)
                    lead_prev = lead
            prev = v
        return len(vals).to_bytes(8, "little") + w.nbits.to_bytes(8, "little") + w.to_array().tobytes()

    def decompress(self, blob: bytes) -> np.ndarray:
        if not blob:
            return np.empty(0, dtype=np.uint64)
        n = int.from_bytes(blob[:8], "little")
        nbits = int.from_bytes(blob[8:16], "little")
        r = BitReader(np.frombuffer(blob, dtype=np.uint64, offset=16), nbits)
        out = np.empty(n, dtype=np.uint64)
        pos = 0
        prev = r.read(pos, 64)
        pos += 64
        out[0] = prev
        lead_prev = -1
        for i in range(1, n):
            flag = r.read(pos, 2)
            pos += 2
            if flag == 0b00:
                xor = 0
                lead_prev = 65
            elif flag == 0b10:  # centre case
                code = r.read(pos, 3)
                pos += 3
                centre = r.read(pos, 6)
                pos += 6
                lead = _ROUND[code]
                bits = r.read(pos, centre)
                pos += centre
                xor = bits << (64 - lead - centre)
                lead_prev = 65
            elif flag == 0b01:  # same leading
                xor = r.read(pos, 64 - lead_prev)
                pos += 64 - lead_prev
            else:  # new leading
                code = r.read(pos, 3)
                pos += 3
                lead = _ROUND[code]
                xor = r.read(pos, 64 - lead)
                pos += 64 - lead
                lead_prev = lead
            prev = (prev ^ xor) & _MASK64
            out[i] = prev
        return out


class Chimp128Codec:
    name = "Chimp128"
    domain = "bits"
    window = 128

    def compress(self, values: np.ndarray) -> bytes:
        vals = np.asarray(values, dtype=np.uint64)
        w = BitWriter()
        n = len(vals)
        if n == 0:
            return b""
        ints = [int(v) for v in vals]
        w.write(ints[0], 64)
        lead_prev = -1
        for i in range(1, n):
            v = ints[i]
            lo = max(0, i - self.window)
            # reference with most trailing zeros in the XOR
            best_j, best_tz, best_xor = i - 1, -1, 0
            for j in range(lo, i):
                x = v ^ ints[j]
                tz = _ctz64(x)
                if tz > best_tz:
                    best_j, best_tz, best_xor = j, tz, x
            idx = i - 1 - best_j  # 0 == immediately previous
            if best_xor == 0:
                w.write(0b00, 2)
                w.write(idx, 7)
                lead_prev = 65
            elif best_tz > 6:
                w.write(0b10, 2)
                w.write(idx, 7)
                code = _lead_code(_clz64(best_xor))
                lead = _ROUND[code]
                w.write(code, 3)
                centre = 64 - lead - best_tz
                w.write(centre, 6)
                w.write(best_xor >> best_tz, centre)
                lead_prev = 65
            else:
                # fall back to the Chimp path against the previous value
                xor = v ^ ints[i - 1]
                code = _lead_code(_clz64(xor))
                lead = _ROUND[code]
                if lead == lead_prev:
                    w.write(0b01, 2)
                    w.write(xor, 64 - lead)
                else:
                    w.write(0b11, 2)
                    w.write(code, 3)
                    w.write(xor, 64 - lead)
                    lead_prev = lead
        return n.to_bytes(8, "little") + w.nbits.to_bytes(8, "little") + w.to_array().tobytes()

    def decompress(self, blob: bytes) -> np.ndarray:
        if not blob:
            return np.empty(0, dtype=np.uint64)
        n = int.from_bytes(blob[:8], "little")
        nbits = int.from_bytes(blob[8:16], "little")
        r = BitReader(np.frombuffer(blob, dtype=np.uint64, offset=16), nbits)
        out = [0] * n
        pos = 0
        out[0] = r.read(pos, 64)
        pos += 64
        lead_prev = -1
        for i in range(1, n):
            flag = r.read(pos, 2)
            pos += 2
            if flag == 0b00:
                idx = r.read(pos, 7)
                pos += 7
                out[i] = out[i - 1 - idx]
                lead_prev = 65
            elif flag == 0b10:
                idx = r.read(pos, 7)
                pos += 7
                code = r.read(pos, 3)
                pos += 3
                centre = r.read(pos, 6)
                pos += 6
                lead = _ROUND[code]
                bits = r.read(pos, centre)
                pos += centre
                trail = 64 - lead - centre
                out[i] = out[i - 1 - idx] ^ (bits << trail)
                lead_prev = 65
            elif flag == 0b01:
                xor = r.read(pos, 64 - lead_prev)
                pos += 64 - lead_prev
                out[i] = out[i - 1] ^ xor
            else:
                code = r.read(pos, 3)
                pos += 3
                lead = _ROUND[code]
                xor = r.read(pos, 64 - lead)
                pos += 64 - lead
                out[i] = out[i - 1] ^ xor
                lead_prev = lead
        return np.asarray(out, dtype=np.uint64)
