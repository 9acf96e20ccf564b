"""Bit substrate: writer/reader, packed arrays, vectorised reads."""
import numpy as np
import pytest
from hypothesis import given, settings, strategies as st

from repro.core.bitstream import (
    BitReader, BitWriter, PackedArray, bits_for, bits_for_signed,
    read_packed, signed_width,
)


class TestBitsFor:
    @pytest.mark.parametrize("v,expect", [(0, 1), (1, 1), (2, 2), (3, 2), (255, 8), (256, 9)])
    def test_bits_for(self, v, expect):
        assert bits_for(v) == expect

    def test_bits_for_negative_raises(self):
        with pytest.raises(ValueError):
            bits_for(-1)

    @pytest.mark.parametrize("eps,expect", [(1, 2), (2, 3), (4, 4), (8, 5)])
    def test_bits_for_signed_matches_paper_formula(self, eps, expect):
        # ceil(log2(2*eps + 1))
        import math
        assert bits_for_signed(eps) == math.ceil(math.log2(2 * eps + 1)) == expect

    def test_signed_width_zero(self):
        assert signed_width([0, 0, 0]) == 0

    @pytest.mark.parametrize("vals,w", [([1], 2), ([-1], 1), ([-2], 2), ([3, -4], 3), ([7], 4)])
    def test_signed_width(self, vals, w):
        assert signed_width(vals) == w

    def test_signed_width_covers_range(self):
        for v in range(-100, 101):
            w = signed_width([v])
            if w:
                assert -(1 << (w - 1)) <= v <= (1 << (w - 1)) - 1


class TestWriterReader:
    @given(st.lists(st.tuples(st.integers(1, 64), st.data()), max_size=80))
    @settings(max_examples=60, deadline=None)
    def test_roundtrip_random_widths(self, specs):
        w = BitWriter()
        expected = []
        for nbits, data in specs:
            v = data.draw(st.integers(0, (1 << nbits) - 1))
            w.write(v, nbits)
            expected.append((v, nbits))
        r = BitReader(w.to_array(), w.nbits)
        pos = 0
        for v, nbits in expected:
            assert r.read(pos, nbits) == v
            pos += nbits

    def test_zero_width_write(self):
        w = BitWriter()
        w.write(0, 0)
        assert w.nbits == 0

    def test_zero_width_nonzero_value_raises(self):
        with pytest.raises(ValueError):
            BitWriter().write(3, 0)

    def test_out_of_range_read_raises(self):
        w = BitWriter()
        w.write(5, 8)
        r = BitReader(w.to_array(), w.nbits)
        with pytest.raises(IndexError):
            r.read(4, 8)

    def test_word_boundary_spanning(self):
        w = BitWriter()
        w.write(0, 60)
        w.write(0xDEADBEEF, 32)  # spans the 64-bit boundary
        r = BitReader(w.to_array(), w.nbits)
        assert r.read(60, 32) == 0xDEADBEEF

    def test_full_64bit_values(self):
        vals = [0, 1, (1 << 64) - 1, 0x8000000000000000]
        w = BitWriter()
        for v in vals:
            w.write(v, 64)
        r = BitReader(w.to_array(), w.nbits)
        for i, v in enumerate(vals):
            assert r.read(i * 64, 64) == v


class TestPackedArray:
    @given(st.lists(st.integers(0, 10**9), max_size=100))
    @settings(max_examples=50, deadline=None)
    def test_roundtrip(self, vals):
        pa = PackedArray(vals)
        assert pa.to_list() == vals
        assert len(pa) == len(vals)

    def test_width_minimal(self):
        pa = PackedArray([0, 7])
        assert pa.width == 3
        assert pa.size_bits == 6

    def test_negative_raises(self):
        with pytest.raises(ValueError):
            PackedArray([-1])

    def test_index_error(self):
        pa = PackedArray([1, 2])
        with pytest.raises(IndexError):
            pa[2]


class TestReadPacked:
    @given(st.integers(1, 63), st.integers(0, 70), st.integers(0, 200))
    @settings(max_examples=60, deadline=None)
    def test_matches_scalar_reader(self, width, lead_bits, count):
        rng = np.random.default_rng(width * 1000 + count)
        vals = [int(v) for v in rng.integers(0, 1 << width, count, dtype=np.uint64)]
        w = BitWriter()
        w.write(0, lead_bits) if lead_bits else None
        for v in vals:
            w.write(v, width)
        r = BitReader(w.to_array(), w.nbits)
        got = read_packed(r.words, lead_bits, width, count)
        assert [int(g) for g in got] == vals

    def test_zero_width(self):
        got = read_packed(np.zeros(1, dtype=np.uint64), 0, 0, 5)
        assert list(got) == [0] * 5

    def test_width_64_rejected(self):
        with pytest.raises(ValueError):
            read_packed(np.zeros(2, dtype=np.uint64), 0, 64, 1)
