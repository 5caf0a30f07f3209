"""Basic-window model: window ids, sizes, and arbitrary-window decomposition.

Conventions (0-indexed, half-open — the paper is 1-indexed, closed):

- A series is ``x[0..L-1]``; with basic window size ``B``, window ``wid``
  covers timestamps ``[wid*B, (wid+1)*B)``.
- A query window is ``(start, end)`` with ``start`` inclusive and ``end``
  exclusive; its length is ``end - start``.

``decompose`` implements the κ/χ construction of §3.1.1: an arbitrary query
window splits into an optional *partial head* (tail of one basic window), a
run of *interior* full basic windows whose sketches are pre-computed, and an
optional *partial tail* (head of one basic window). Lemma 1 (weighted form)
recombines stats over these unequal pieces exactly.
"""
from __future__ import annotations

from dataclasses import dataclass


@dataclass(frozen=True)
class Piece:
    """One partial piece of a query window inside basic window ``wid``.

    ``start``/``end`` are absolute timestamps, half-open. Partial pieces
    must be sketched from raw data at query time.
    """

    wid: int
    start: int
    end: int

    @property
    def size(self) -> int:
        return self.end - self.start


@dataclass(frozen=True)
class Decomposition:
    """Arbitrary query window split into sketchable and raw pieces."""

    head: Piece | None  # partial first basic window (needs raw data)
    interior: range  # wids fully covered (answerable from sketches)
    tail: Piece | None  # partial last basic window (needs raw data)
    B: int  # interior basic window size

    def sizes(self) -> list[int]:
        """The ``B_j`` sequence of Lemma 1, in temporal order."""
        out: list[int] = []
        if self.head is not None:
            out.append(self.head.size)
        out.extend([self.B] * len(self.interior))
        if self.tail is not None:
            out.append(self.tail.size)
        return out

    def length(self) -> int:
        return sum(self.sizes())


def window_id(t: int, B: int) -> int:
    """Basic window id of timestamp ``t`` for basic window size ``B``."""
    return t // B


def num_windows(L: int, B: int) -> int:
    """Number of (possibly ragged-last) basic windows covering ``L`` points."""
    return (L + B - 1) // B


def aligned_range(start: int, end: int, B: int) -> range:
    """Wid range for an *aligned* query window; raises if not aligned."""
    if start % B != 0 or end % B != 0:
        raise ValueError(f"window [{start},{end}) not aligned to B={B}")
    if end <= start:
        raise ValueError(f"empty query window [{start},{end})")
    return range(start // B, end // B)


def decompose(start: int, end: int, B: int) -> Decomposition:
    """Split ``[start, end)`` into head-partial / interior-full / tail-partial.

    The interior wids index pre-computed sketches; head/tail (when present)
    must be sketched from raw data at query time (§3.1.1). Handles every
    alignment case, including windows shorter than ``B`` that live inside a
    single basic window (pure head, empty interior, no tail).
    """
    if end <= start:
        raise ValueError(f"empty query window [{start},{end})")
    if start < 0:
        raise ValueError(f"negative start {start}")
    first_wid = start // B
    last_wid = (end - 1) // B

    if first_wid == last_wid and (start % B != 0 or end % B != 0):
        # window entirely inside one basic window, not covering it fully
        head = Piece(first_wid, start, end)
        return Decomposition(head, range(first_wid, first_wid), None, B)

    head = None
    if start % B == 0:
        interior_lo = first_wid
    else:
        head = Piece(first_wid, start, (first_wid + 1) * B)
        interior_lo = first_wid + 1

    tail = None
    if end % B == 0:
        interior_hi = last_wid + 1
    else:
        tail = Piece(last_wid, last_wid * B, end)
        interior_hi = last_wid

    return Decomposition(head, range(interior_lo, interior_hi), tail, B)
