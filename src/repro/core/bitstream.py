"""Bit-level substrate: a bit writer/reader and fixed-width packed arrays.

Everything NeaTS stores (corrections ``C``, packed integer arrays, the
Elias-Fano lower-bits block, wavelet-tree bitmaps) sits on top of this
module.  Words are stored little-endian-in-bits inside a ``numpy``
``uint64`` buffer: bit ``i`` of the stream is bit ``i % 64`` of word
``i // 64``.
"""
from __future__ import annotations

import numpy as np

__all__ = [
    "BitWriter", "BitReader", "PackedArray", "bits_for", "bits_for_signed",
    "read_packed", "signed_width", "gather_packed", "gather_bits", "pad_words",
]


def bits_for(max_value: int) -> int:
    """Bits needed to store unsigned values in ``[0, max_value]`` (min 1)."""
    if max_value < 0:
        raise ValueError("max_value must be non-negative")
    return max(1, int(max_value).bit_length())


def bits_for_signed(max_abs: int) -> int:
    """Bits needed for the correction alphabet ``[-max_abs, +max_abs]``.

    The paper stores corrections in ``ceil(log2(2*eps + 1))`` bits; this is
    exactly that with ``max_abs = eps`` (min 1 bit so a fragment always has a
    well-defined correction width of at least zero-cost semantics).
    """
    if max_abs < 0:
        raise ValueError("max_abs must be non-negative")
    return max(1, int(2 * max_abs).bit_length())


def signed_width(values) -> int:
    """Smallest w such that every value fits two's-complement in w bits.

    Returns 0 when all values are zero (the paper's eps=0 case stores no
    correction bits at all).
    """
    w = 0
    for c in values:
        c = int(c)
        need = (c.bit_length() + 1) if c >= 0 else ((-c - 1).bit_length() + 1)
        if c == 0:
            need = 0
        w = max(w, need)
    return w


def read_packed(words: np.ndarray, start_bit: int, width: int, count: int) -> np.ndarray:
    """Vectorised read of ``count`` fixed-``width`` fields starting at
    ``start_bit``; returns unsigned values as uint64.

    This is the SIMD-style decoding loop of Algorithm 2: every correction in
    a fragment has the same width, so the whole fragment decodes with a few
    numpy ops instead of a per-value Python loop.
    """
    if width == 0:
        return np.zeros(count, dtype=np.uint64)
    if not 1 <= width <= 63:
        raise ValueError("vectorised path supports widths 1..63")
    pos = start_bit + width * np.arange(count, dtype=np.int64)
    w = (pos >> 6).astype(np.int64)
    sh = (pos & 63).astype(np.uint64)
    padded = np.concatenate([words.astype(np.uint64), np.zeros(1, dtype=np.uint64)])
    lo = padded[w] >> sh
    sh2 = (np.uint64(64) - sh) & np.uint64(63)  # 0 when sh == 0
    hi = np.where(sh == 0, np.uint64(0), padded[w + 1] << sh2)
    mask = np.uint64((1 << width) - 1)
    return (lo | hi) & mask


def pad_words(words: np.ndarray) -> np.ndarray:
    """One trailing zero word so cross-boundary gathers never index OOB.

    Gather helpers accept pre-padded buffers via ``padded=True`` — padding
    per call would copy the whole bit buffer on every query."""
    return np.concatenate([words.astype(np.uint64), np.zeros(1, dtype=np.uint64)])


def gather_packed(words: np.ndarray, width: int, idx: np.ndarray, *, padded: bool = False) -> np.ndarray:
    """Gather fixed-``width`` fields at arbitrary element indexes ``idx``."""
    if width == 0:
        return np.zeros(len(idx), dtype=np.uint64)
    if not 1 <= width <= 63:
        raise ValueError("gather supports widths 1..63")
    pos = width * np.asarray(idx, dtype=np.int64)
    w = (pos >> 6).astype(np.int64)
    sh = (pos & 63).astype(np.uint64)
    pw = words if padded else pad_words(words)
    lo = pw[w] >> sh
    sh2 = (np.uint64(64) - sh) & np.uint64(63)
    hi = np.where(sh == 0, np.uint64(0), pw[w + 1] << sh2)
    return (lo | hi) & np.uint64((1 << width) - 1)


def gather_bits(words: np.ndarray, pos: np.ndarray, width: np.ndarray, *, padded: bool = False) -> np.ndarray:
    """Per-element bit-field gather: read ``width[i]`` bits at bit offset
    ``pos[i]``.  Widths may differ per element (0..63); width 0 yields 0."""
    pos = np.asarray(pos, dtype=np.int64)
    width = np.asarray(width, dtype=np.uint64)
    w = (pos >> 6).astype(np.int64)
    sh = (pos & 63).astype(np.uint64)
    pw = words if padded else pad_words(words)
    lo = pw[w] >> sh
    sh2 = (np.uint64(64) - sh) & np.uint64(63)
    hi = np.where(sh == 0, np.uint64(0), pw[w + 1] << sh2)
    mask = np.where(width == 0, np.uint64(0), (np.uint64(1) << width) - np.uint64(1))
    return (lo | hi) & mask


class BitWriter:
    """Append-only bit stream writer."""

    def __init__(self) -> None:
        self._words: list[int] = [0]
        self._nbits = 0

    def __len__(self) -> int:
        return self._nbits

    def write(self, value: int, nbits: int) -> None:
        """Append the ``nbits`` low bits of ``value`` (LSB first)."""
        if nbits < 0 or (nbits == 0 and value != 0):
            raise ValueError(f"cannot write value {value} in {nbits} bits")
        value &= (1 << nbits) - 1 if nbits else 0
        while nbits > 0:
            pos = self._nbits & 63
            take = min(nbits, 64 - pos)
            self._words[-1] |= (value & ((1 << take) - 1)) << pos
            value >>= take
            nbits -= take
            self._nbits += take
            if (self._nbits & 63) == 0:
                self._words.append(0)

    def write_unary(self, q: int) -> None:
        """``q`` zero bits followed by a one bit (Elias-Fano upper part)."""
        for _ in range(q):
            self.write(0, 1)
        self.write(1, 1)

    def to_array(self) -> np.ndarray:
        n_words = (self._nbits + 63) // 64
        arr = np.zeros(max(1, n_words), dtype=np.uint64)
        for i in range(n_words):
            arr[i] = self._words[i] & ((1 << 64) - 1)
        return arr

    @property
    def nbits(self) -> int:
        return self._nbits


class BitReader:
    """Random-access reader over a ``uint64`` word array produced by BitWriter."""

    def __init__(self, words: np.ndarray, nbits: int) -> None:
        self._words = np.ascontiguousarray(words, dtype=np.uint64)
        self._nbits = int(nbits)

    def __len__(self) -> int:
        return self._nbits

    def read(self, pos: int, nbits: int) -> int:
        """Read ``nbits`` bits starting at bit offset ``pos`` (LSB first)."""
        if nbits == 0:
            return 0
        if pos < 0 or pos + nbits > self._nbits:
            raise IndexError(f"bit range [{pos}, {pos + nbits}) out of [0, {self._nbits})")
        w, off = pos >> 6, pos & 63
        out = int(self._words[w]) >> off
        got = 64 - off
        while got < nbits:
            w += 1
            out |= int(self._words[w]) << got
            got += 64
        return out & ((1 << nbits) - 1)

    @property
    def words(self) -> np.ndarray:
        return self._words


class PackedArray:
    """Fixed-width unsigned integer array with O(1) access.

    Cell width is ``bits_for(max(values))`` so "cells whose bit size is just
    enough to contain the largest value" (paper §III-C) holds.
    """

    def __init__(self, values, width: int | None = None) -> None:
        vals = [int(v) for v in values]
        if any(v < 0 for v in vals):
            raise ValueError("PackedArray stores unsigned values; map signed first")
        self._n = len(vals)
        self._width = width if width is not None else bits_for(max(vals, default=0))
        w = BitWriter()
        for v in vals:
            w.write(v, self._width)
        self._reader = BitReader(w.to_array(), w.nbits)

    def __len__(self) -> int:
        return self._n

    def __getitem__(self, i: int) -> int:
        if not 0 <= i < self._n:
            raise IndexError(i)
        return self._reader.read(i * self._width, self._width)

    def to_list(self) -> list[int]:
        return [self[i] for i in range(self._n)]

    @property
    def width(self) -> int:
        return self._width

    @property
    def size_bits(self) -> int:
        """Payload size (cells only; metadata accounted by the container)."""
        return self._n * self._width

    @property
    def words(self) -> np.ndarray:
        return self._reader.words
