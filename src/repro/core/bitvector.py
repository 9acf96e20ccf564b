"""Plain bitvector with an O(1) rank directory (Jacobson-style, one level).

Used for the constant-time random-access variant of NeaTS where ``S`` is a
length-n bitvector with a 1 at each fragment start (Section III-C, last
paragraph).
"""
from __future__ import annotations

import numpy as np

__all__ = ["RankBitvector"]

_BLOCK = 512  # bits per superblock in the rank directory


class RankBitvector:
    def __init__(self, positions, length: int) -> None:
        """Bitvector of ``length`` bits with ones at ``positions``."""
        self._len = int(length)
        words = np.zeros((self._len + 63) // 64 + 1, dtype=np.uint64)
        pos = np.asarray(sorted(positions), dtype=np.int64)
        if len(pos) and (pos[0] < 0 or pos[-1] >= length):
            raise ValueError("position out of range")
        for p in pos:
            words[p >> 6] |= np.uint64(1) << np.uint64(p & 63)
        self._words = words
        # superblock ranks: number of ones before each block of _BLOCK bits
        counts = []
        acc = 0
        popcnt = _popcount64(words)
        per_word = popcnt
        wpb = _BLOCK // 64
        for blk in range(0, len(words), wpb):
            counts.append(acc)
            acc += int(per_word[blk:blk + wpb].sum())
        self._dir = np.asarray(counts, dtype=np.int64)
        self._nones = len(pos)

    def __len__(self) -> int:
        return self._len

    @property
    def n_ones(self) -> int:
        return self._nones

    @property
    def size_bits(self) -> int:
        return self._len + len(self._dir) * 64

    def get(self, i: int) -> bool:
        if not 0 <= i < self._len:
            raise IndexError(i)
        return bool((int(self._words[i >> 6]) >> (i & 63)) & 1)

    def rank1(self, i: int) -> int:
        """Number of ones in positions [0, i) — O(1) with the directory."""
        if not 0 <= i <= self._len:
            raise IndexError(i)
        blk = i // _BLOCK
        r = int(self._dir[blk])
        wstart = blk * (_BLOCK // 64)
        wend = i >> 6
        for w in range(wstart, wend):
            r += int(self._words[w]).bit_count()
        if i & 63:
            r += (int(self._words[wend]) & ((1 << (i & 63)) - 1)).bit_count()
        return r

    def predecessor_one(self, i: int) -> int:
        """Largest position p <= i with a one bit; -1 if none (scan back)."""
        w = i >> 6
        mask = (1 << ((i & 63) + 1)) - 1
        cur = int(self._words[w]) & mask
        while True:
            if cur:
                return (w << 6) + cur.bit_length() - 1
            w -= 1
            if w < 0:
                return -1
            cur = int(self._words[w])


def _popcount64(words: np.ndarray) -> np.ndarray:
    """Vectorised popcount per uint64 word."""
    v = words.copy()
    m1 = np.uint64(0x5555555555555555)
    m2 = np.uint64(0x3333333333333333)
    m4 = np.uint64(0x0F0F0F0F0F0F0F0F)
    h = np.uint64(0x0101010101010101)
    v = v - ((v >> np.uint64(1)) & m1)
    v = (v & m2) + ((v >> np.uint64(2)) & m2)
    v = (v + (v >> np.uint64(4))) & m4
    return ((v * h) >> np.uint64(56)).astype(np.int64)
