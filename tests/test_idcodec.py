"""Tests for the delta + Huffman trajectory-ID codec."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.index.idcodec import decode_ids, encode_ids


class TestRoundtrip:
    @pytest.mark.parametrize(
        "ids",
        [
            [1],
            [0],
            [5, 5, 5],
            [1, 2, 3, 4, 5],
            [10, 1000, 999999],
            list(range(100)),
            [7] * 50,
            [2, 4, 8, 16, 1024],
        ],
    )
    def test_roundtrip(self, ids):
        enc = encode_ids(np.array(ids))
        assert decode_ids(enc).tolist() == sorted(ids)

    def test_empty(self):
        enc = encode_ids(np.array([], dtype=np.int64))
        assert enc.n_ids == 0
        assert decode_ids(enc).tolist() == []

    def test_unsorted_input_sorted_output(self):
        enc = encode_ids(np.array([9, 1, 5]))
        assert decode_ids(enc).tolist() == [1, 5, 9]

    @settings(max_examples=50, deadline=None)
    @given(st.lists(st.integers(0, 10**6), min_size=1, max_size=200))
    def test_property_roundtrip(self, ids):
        enc = encode_ids(np.array(ids, dtype=np.int64))
        assert decode_ids(enc).tolist() == sorted(ids)


class TestCompression:
    def test_dense_runs_compress_well(self):
        """Consecutive IDs have a single delta symbol -> ~1 bit each."""
        ids = np.arange(1000, 2000)
        enc = encode_ids(ids)
        assert enc.encoded_bits <= 2 * len(ids)

    def test_beats_raw_for_clustered_ids(self):
        ids = np.arange(5000, 5500)
        enc = encode_ids(ids)
        assert enc.total_bits < len(ids) * 64

    def test_skewed_deltas_short_codes(self):
        """Frequent deltas get shorter codes than rare ones."""
        ids = np.cumsum([1] * 200 + [997] + [500])
        enc = encode_ids(ids)
        assert enc.lengths[1] < enc.lengths[997]
        assert enc.lengths[1] < enc.lengths[500]

    def test_encoded_bits_matches_lengths(self):
        ids = np.array([3, 7, 8, 20])
        enc = encode_ids(ids)
        deltas = [3, 4, 1, 12]
        expect = sum(enc.lengths[d] for d in deltas)
        assert enc.encoded_bits == expect

    def test_data_is_bytes(self):
        enc = encode_ids(np.array([1, 2, 3]))
        assert isinstance(enc.data, bytes)
        assert len(enc.data) == (enc.encoded_bits + 7) // 8

    def test_total_bits_includes_table(self):
        enc = encode_ids(np.array([1, 100]))
        assert enc.total_bits > enc.encoded_bits
