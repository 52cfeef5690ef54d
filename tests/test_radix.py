"""Unit + property tests for radix partitioning primitives."""
import numpy as np
import pandas as pd
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core import radix


class TestPartitionIds:
    def test_low_bits(self):
        assert list(radix.partition_ids(np.array([0, 1, 8, 9]), 3)) == [0, 1, 0, 1]

    def test_hash_partition_range(self):
        pids = radix.hash_partition_ids(np.arange(1000), 7)
        assert pids.min() >= 0 and pids.max() < 7

    def test_hash_partition_spreads(self):
        counts = np.bincount(radix.hash_partition_ids(np.arange(10000), 8), minlength=8)
        assert counts.min() > 800  # roughly uniform


class TestHistogram:
    def test_counts(self):
        h = radix.histogram(np.array([0, 0, 2]), 4)
        assert list(h) == [2, 0, 1, 0]

    def test_empty(self):
        assert list(radix.histogram(np.array([], dtype=np.int64), 3)) == [0, 0, 0]


class TestScatter:
    def test_partitions_contiguous_and_stable(self):
        pdf = pd.DataFrame({"k": [3, 1, 2, 1, 3], "seq": [0, 1, 2, 3, 4]})
        pids = pdf["k"].to_numpy() % 2
        parts = radix.scatter(pdf, pids, 2)
        assert sorted(parts[0]["k"]) == [2]
        assert list(parts[1]["seq"]) == [0, 1, 3, 4]  # stability preserved

    def test_empty_input(self):
        pdf = pd.DataFrame({"k": pd.Series([], dtype="int64")})
        parts = radix.scatter(pdf, np.array([], dtype=np.int64), 3)
        assert len(parts) == 3 and all(len(p) == 0 for p in parts)

    def test_scatter_arrays_matches_scatter(self):
        ks = np.array([5, 6, 7, 8, 9])
        vs = np.array([50, 60, 70, 80, 90])
        pids = ks % 4
        by_arrays = radix.scatter_arrays([ks, vs], pids, 4)
        by_frame = radix.scatter(pd.DataFrame({"k": ks, "v": vs}), pids, 4)
        for p in range(4):
            assert list(by_arrays[p][0]) == list(by_frame[p]["k"])
            assert list(by_arrays[p][1]) == list(by_frame[p]["v"])


@settings(max_examples=100, deadline=None)
@given(
    keys=st.lists(st.integers(0, 1 << 30), max_size=200),
    bits=st.integers(1, 6),
)
def test_scatter_partition_property(keys, bits):
    ks = np.array(keys, dtype=np.int64)
    pdf = pd.DataFrame({"k": ks})
    pids = radix.partition_ids(ks, bits)
    n = 1 << bits
    parts = radix.scatter(pdf, pids, n)
    # every row lands in the partition matching its low bits; none lost
    assert sum(len(p) for p in parts) == len(ks)
    for p, frame in enumerate(parts):
        if len(frame):
            assert (radix.partition_ids(frame["k"].to_numpy(), bits) == p).all()
