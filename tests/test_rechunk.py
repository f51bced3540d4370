"""Algorithm 1 (auto rechunk) — including the paper's worked example."""
import numpy as np
import pytest
from hypothesis import given, settings, strategies as st

from repro.core.rechunk import auto_rechunk, chunk_slices


class TestPaperExample:
    def test_qr_worked_example(self):
        """Paper § V-D: shape (10000, 10000), dim_to_size {1:10000},
        itemsize 8, 128 MiB limit → (1677, 10000) × 5 + (1615, 10000)."""
        plan = auto_rechunk((10000, 10000), {1: 10000}, 8, 128 << 20)
        assert plan[0] == [1677] * 5 + [1615]
        assert plan[1] == [10000]

    def test_chunks_under_limit(self):
        plan = auto_rechunk((10000, 10000), {1: 10000}, 8, 128 << 20)
        for rows in plan[0]:
            assert rows * 10000 * 8 <= 128 << 20


class TestBasics:
    def test_1d(self):
        plan = auto_rechunk((1000,), {}, 8, 800)
        assert sum(plan[0]) == 1000
        assert all(c * 8 <= 800 for c in plan[0])

    def test_no_free_dims(self):
        plan = auto_rechunk((10, 20), {0: 10, 1: 20}, 8, 1 << 20)
        assert plan == {0: [10], 1: [20]}

    def test_fits_entirely(self):
        plan = auto_rechunk((100, 10), {1: 10}, 8, 1 << 30)
        assert plan[0] == [100]

    def test_two_free_dims_split_geometrically(self):
        plan = auto_rechunk((1000, 1000), {}, 8, 8 * 100 * 100)
        assert sum(plan[0]) == 1000
        assert sum(plan[1]) == 1000
        # cur_size = sqrt(10000) = 100 on the first pass
        assert plan[0][0] == 100
        assert plan[1][0] == 100

    def test_progress_floor_single_row(self):
        # one row is larger than the limit: the max(·,1) floor still
        # guarantees progress with 1-row chunks
        plan = auto_rechunk((10, 1000), {1: 1000}, 8, 100)
        assert plan[0] == [1] * 10

    def test_fixed_dim_out_of_range(self):
        with pytest.raises(ValueError):
            auto_rechunk((10, 10), {5: 10}, 8, 1000)

    def test_fixed_extent_exceeds_shape(self):
        with pytest.raises(ValueError):
            auto_rechunk((10, 10), {1: 99}, 8, 1000)


class TestChunkSlices:
    def test_slices(self):
        assert chunk_slices([3, 4, 2]) == [(0, 3), (3, 7), (7, 9)]

    def test_empty(self):
        assert chunk_slices([]) == []


@settings(max_examples=60, deadline=None)
@given(
    rows=st.integers(1, 5000),
    cols=st.integers(1, 200),
    limit_kb=st.integers(1, 512),
)
def test_rowsplit_invariants(rows, cols, limit_kb):
    """Row extents cover the shape exactly and respect the limit
    whenever a single row fits at all."""
    limit = limit_kb * 1024
    plan = auto_rechunk((rows, cols), {1: cols}, 8, limit)
    extents = plan[0]
    assert sum(extents) == rows
    assert all(e >= 1 for e in extents)
    row_bytes = cols * 8
    if row_bytes <= limit:
        assert all(e * row_bytes <= limit for e in extents)
