"""Gorilla XOR compression for 64-bit values (Pelkonen et al., VLDB 2015).

The classic scheme: XOR each value with its predecessor and encode

* ``0``                      — XOR is zero;
* ``10`` + meaningful bits   — leading/trailing zeros fit the previous window;
* ``11`` + 5-bit leading + 6-bit length + meaningful bits — new window.

Operates on the raw 64-bit payload (doubles are passed as their IEEE bits,
which is what Gorilla was designed for).
"""
from __future__ import annotations

import numpy as np

from ..core.bitstream import BitReader, BitWriter

__all__ = ["GorillaCodec"]

_MASK64 = (1 << 64) - 1


def _clz64(x: int) -> int:
    return 64 - x.bit_length() if x else 64


def _ctz64(x: int) -> int:
    return (x & -x).bit_length() - 1 if x else 64


class GorillaCodec:
    """Stream codec interface: compress(uint64 array) -> bytes."""

    name = "Gorilla"
    domain = "bits"  # consumes raw 64-bit payloads

    def compress(self, values: np.ndarray) -> bytes:
        vals = np.asarray(values, dtype=np.uint64)
        w = BitWriter()
        if len(vals) == 0:
            return b""
        prev = int(vals[0])
        w.write(prev, 64)
        lead_prev, tlen_prev = -1, -1
        for v in vals[1:]:
            v = int(v)
            xor = (v ^ prev) & _MASK64
            if xor == 0:
                w.write(0, 1)
            else:
                lead = min(_clz64(xor), 31)
                trail = _ctz64(xor)
                if lead_prev >= 0 and lead >= lead_prev and trail >= 64 - lead_prev - tlen_prev:
                    w.write(0b01, 2)  # '10' control (LSB-first storage)
                    w.write(xor >> (64 - lead_prev - tlen_prev), tlen_prev)
                else:
                    tlen = 64 - lead - trail
                    w.write(0b11, 2)
                    w.write(lead, 5)
                    w.write(tlen - 1, 6)
                    w.write(xor >> trail, tlen)
                    lead_prev, tlen_prev = lead, tlen
            prev = v
        return len(vals).to_bytes(8, "little") + w.nbits.to_bytes(8, "little") + w.to_array().tobytes()

    def decompress(self, blob: bytes) -> np.ndarray:
        if not blob:
            return np.empty(0, dtype=np.uint64)
        n = int.from_bytes(blob[:8], "little")
        nbits = int.from_bytes(blob[8:16], "little")
        words = np.frombuffer(blob, dtype=np.uint64, offset=16)
        r = BitReader(words, nbits)
        out = np.empty(n, dtype=np.uint64)
        pos = 0
        prev = r.read(0, 64)
        pos += 64
        out[0] = prev
        lead_prev, tlen_prev = -1, -1
        for i in range(1, n):
            ctrl = r.read(pos, 1)
            pos += 1
            if ctrl == 0:
                out[i] = prev
                continue
            ctrl2 = r.read(pos, 1)
            pos += 1
            if ctrl2 == 0:  # '10': reuse window
                bits = r.read(pos, tlen_prev)
                pos += tlen_prev
                xor = bits << (64 - lead_prev - tlen_prev)
            else:  # '11': new window
                lead = r.read(pos, 5)
                pos += 5
                tlen = r.read(pos, 6) + 1
                pos += 6
                bits = r.read(pos, tlen)
                pos += tlen
                trail = 64 - lead - tlen
                xor = bits << trail
                lead_prev, tlen_prev = lead, tlen
            prev = (prev ^ xor) & _MASK64
            out[i] = prev
        return out
