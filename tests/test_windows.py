"""Unit tests for the basic-window model and arbitrary-window decomposition."""
import pytest
from hypothesis import given
from hypothesis import strategies as st

from repro.core import windows


class TestWindowId:
    @pytest.mark.parametrize("t,B,expect", [(0, 50, 0), (49, 50, 0), (50, 50, 1), (99, 50, 1), (100, 50, 2), (7, 1, 7)])
    def test_examples(self, t, B, expect):
        assert windows.window_id(t, B) == expect

    @pytest.mark.parametrize("L,B,expect", [(100, 50, 2), (101, 50, 3), (99, 50, 2), (1, 50, 1), (0, 50, 0), (50, 50, 1)])
    def test_num_windows(self, L, B, expect):
        assert windows.num_windows(L, B) == expect


class TestAlignedRange:
    def test_aligned(self):
        assert list(windows.aligned_range(100, 300, 50)) == [2, 3, 4, 5]

    @pytest.mark.parametrize("start,end", [(10, 300), (100, 310), (7, 13)])
    def test_rejects_unaligned(self, start, end):
        with pytest.raises(ValueError):
            windows.aligned_range(start, end, 50)

    def test_rejects_empty(self):
        with pytest.raises(ValueError):
            windows.aligned_range(100, 100, 50)


class TestDecompose:
    def test_fully_aligned_has_no_partials(self):
        d = windows.decompose(100, 300, 50)
        assert d.head is None and d.tail is None
        assert list(d.interior) == [2, 3, 4, 5]

    def test_head_partial(self):
        d = windows.decompose(130, 300, 50)
        assert d.head == windows.Piece(2, 130, 150)
        assert list(d.interior) == [3, 4, 5]
        assert d.tail is None

    def test_tail_partial(self):
        d = windows.decompose(100, 280, 50)
        assert d.head is None
        assert list(d.interior) == [2, 3, 4]
        assert d.tail == windows.Piece(5, 250, 280)

    def test_both_partials(self):
        d = windows.decompose(137, 583, 64)
        assert d.head == windows.Piece(2, 137, 192)
        assert list(d.interior) == list(range(3, 9))
        assert d.tail == windows.Piece(9, 576, 583)

    def test_inside_single_window(self):
        d = windows.decompose(110, 140, 50)
        assert d.head == windows.Piece(2, 110, 140)
        assert len(d.interior) == 0 and d.tail is None

    def test_exactly_one_window(self):
        d = windows.decompose(100, 150, 50)
        assert d.head is None and d.tail is None
        assert list(d.interior) == [2]

    def test_adjacent_partials_no_interior(self):
        d = windows.decompose(40, 60, 50)
        assert d.head == windows.Piece(0, 40, 50)
        assert d.tail == windows.Piece(1, 50, 60)
        assert len(d.interior) == 0

    @pytest.mark.parametrize("start,end", [(5, 5), (10, 3)])
    def test_rejects_empty(self, start, end):
        with pytest.raises(ValueError):
            windows.decompose(start, end, 50)

    def test_rejects_negative(self):
        with pytest.raises(ValueError):
            windows.decompose(-3, 10, 50)

    @given(
        start=st.integers(0, 500),
        length=st.integers(1, 700),
        B=st.integers(1, 97),
    )
    def test_sizes_partition_the_window(self, start, length, B):
        """The B_j sequence always partitions [start, end) exactly."""
        end = start + length
        d = windows.decompose(start, end, B)
        sizes = d.sizes()
        assert sum(sizes) == length
        assert all(1 <= s <= B for s in sizes)
        # interior pieces are exactly the fully-covered wids
        for wid in d.interior:
            assert wid * B >= start and (wid + 1) * B <= end
        # head/tail never cover a full window (else they'd be interior)
        if d.head is not None:
            assert d.head.size < B or len(d.interior) == 0
        if d.tail is not None:
            assert d.tail.size < B

    @given(start=st.integers(0, 300), length=st.integers(1, 400), B=st.integers(1, 64))
    def test_reconstructs_contiguous_timestamps(self, start, length, B):
        """Pieces + interior windows tile [start, end) without gaps/overlap."""
        end = start + length
        d = windows.decompose(start, end, B)
        spans = []
        if d.head is not None:
            spans.append((d.head.start, d.head.end))
        spans.extend((w * B, (w + 1) * B) for w in d.interior)
        if d.tail is not None:
            spans.append((d.tail.start, d.tail.end))
        spans.sort()
        assert spans[0][0] == start and spans[-1][1] == end
        for (_, e1), (s2, _) in zip(spans, spans[1:]):
            assert e1 == s2
