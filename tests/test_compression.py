"""Unit + property tests for the drop-F-bits key/value compression."""
import numpy as np
import pandas as pd
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core.compression import CompressionSpec
from repro.core.radix import partition_ids


class TestSpecValidation:
    def test_word_overflow_rejected(self):
        with pytest.raises(ValueError, match="> 64"):
            CompressionSpec(p_bits=40, f_bits=10)

    def test_boundary_fits(self):
        CompressionSpec(p_bits=34, f_bits=4)  # 2*34-4 = 64

    def test_bad_fanout_bits(self):
        with pytest.raises(ValueError):
            CompressionSpec(p_bits=8, f_bits=-1)
        with pytest.raises(ValueError):
            CompressionSpec(p_bits=8, f_bits=9)

    def test_zero_f_bits_roundtrip(self):
        spec = CompressionSpec(p_bits=16, f_bits=0)
        assert spec.fanout == 1
        keys = np.array([0, 5, 65535])
        vals = np.array([1, 2, 3])
        k2, v2 = spec.decompress(spec.compress(keys, vals), partition_id=0)
        assert (k2 == keys).all() and (v2 == vals).all()

    def test_fanout(self):
        assert CompressionSpec(p_bits=20, f_bits=3).fanout == 8


class TestRoundTrip:
    def test_simple_roundtrip(self):
        spec = CompressionSpec(p_bits=20, f_bits=3)
        keys = np.array([0, 1, 7, 8, 9, 123456, (1 << 20) - 1])
        vals = np.array([5, 6, 7, 8, 9, 10, 11])
        words = spec.compress(keys, vals)
        pids = partition_ids(keys, 3)
        for p in range(8):
            m = pids == p
            k2, v2 = spec.decompress(words[m], p)
            assert (k2 == keys[m]).all()
            assert (v2 == vals[m]).all()

    def test_wire_is_one_word(self):
        spec = CompressionSpec(p_bits=20, f_bits=3)
        pdf = pd.DataFrame({"k": [1, 9], "v": [2, 3]})
        out = spec.compress_pdf(pdf)
        assert list(out.columns) == ["kv"]
        assert out["kv"].dtype == np.uint64

    def test_domain_violation_rejected(self):
        spec = CompressionSpec(p_bits=8, f_bits=2)
        with pytest.raises(ValueError, match="dense"):
            spec.compress(np.array([300]), np.array([0]))
        with pytest.raises(ValueError, match="dense"):
            spec.compress(np.array([0]), np.array([300]))

    def test_extra_columns_rejected(self):
        spec = CompressionSpec(p_bits=8, f_bits=2)
        with pytest.raises(ValueError, match="extra cols"):
            spec.compress_pdf(pd.DataFrame({"k": [1], "v": [2], "z": [3]}))

    def test_pdf_roundtrip(self):
        spec = CompressionSpec(p_bits=16, f_bits=2)
        pdf = pd.DataFrame({"k": [4, 8, 12], "v": [1, 2, 3]})  # all pid 0
        back = spec.decompress_pdf(spec.compress_pdf(pdf), partition_id=0)
        pd.testing.assert_frame_equal(back, pdf.astype("int64"))


@settings(max_examples=200, deadline=None)
@given(
    p_bits=st.integers(min_value=4, max_value=30),
    data=st.data(),
)
def test_roundtrip_property(p_bits, data):
    f_bits = data.draw(st.integers(min_value=1, max_value=min(p_bits, 8)))
    spec = CompressionSpec(p_bits=p_bits, f_bits=f_bits)
    n = data.draw(st.integers(min_value=0, max_value=64))
    keys = np.array(
        data.draw(st.lists(st.integers(0, (1 << p_bits) - 1), min_size=n, max_size=n)),
        dtype=np.int64,
    )
    vals = np.array(
        data.draw(st.lists(st.integers(0, (1 << p_bits) - 1), min_size=n, max_size=n)),
        dtype=np.int64,
    )
    words = spec.compress(keys, vals)
    pids = partition_ids(keys, f_bits)
    for p in np.unique(pids):
        m = pids == p
        k2, v2 = spec.decompress(words[m], int(p))
        assert (k2 == keys[m]).all()
        assert (v2 == vals[m]).all()
