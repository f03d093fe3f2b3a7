"""Shared problem model: object sets, states, and window bookkeeping.

Terminology (paper Section 2):

- A *frame* is ``(fid, objset)`` where ``objset`` is the set of object
  ids detected in that frame.
- The *window* at frame ``i`` with size ``w`` covers fids in
  ``[i - w + 1, i]`` (Table 1/2 semantics: with ``w = 4``, frame 0
  expires when frame 4 arrives).
- A *state* ``s = (ID_s, F_s)`` pairs an object set with the frames in
  which it co-occurs.  ``s`` is *valid* iff ``ID_s`` is an MCOS of
  ``F_s``; because the MCOS of a frame set ``F'`` is exactly
  ``intersection of O_f over f in F'``, the valid states of a window
  are exactly the *closed* object sets of the window (closed-itemset
  sense) with their full supporting frame sets.
- A *mark* on frame ``f`` of state ``s`` certifies that the suffix of
  ``F_s`` from ``f`` onward intersects to exactly ``ID_s``.  Frames
  expire oldest-first, so ``s`` stays valid exactly while its newest
  mark is inside the window (paper Theorems 1 and 4).

Object sets are represented as Python ``int`` bitmasks: intersection is
``&``, subset tests are mask comparisons, and cardinality is
``int.bit_count()`` — all C-speed, which keeps the relative cost of
NAIVE / MFS / SSG dominated by *how many* states each algorithm
touches, as in the paper's Java implementation.
"""
from __future__ import annotations

from bisect import bisect_left
from dataclasses import dataclass, field
from typing import Iterable, Iterator


class ObjSetCodec:
    """Bidirectional mapping between object ids and bitmask positions.

    Object ids from the tracker are arbitrary ints; bits are assigned
    densely in first-seen order so masks stay small.
    """

    def __init__(self) -> None:
        self._bit_of: dict[int, int] = {}
        self._oid_of: list[int] = []

    def encode_iter(self, oids: Iterable[int]) -> int:
        """Bitmask for a collection of object ids (assigning new bits)."""
        mask = 0
        bit_of = self._bit_of
        for oid in oids:
            b = bit_of.get(oid)
            if b is None:
                b = len(self._oid_of)
                bit_of[oid] = b
                self._oid_of.append(oid)
            mask |= 1 << b
        return mask

    def encode_one(self, oid: int) -> int:
        """Bitmask with only ``oid``'s bit set."""
        return self.encode_iter((oid,))

    def decode(self, mask: int) -> tuple[int, ...]:
        """Sorted tuple of object ids present in ``mask``."""
        oid_of = self._oid_of
        out = []
        b = 0
        while mask:
            tz = (mask & -mask).bit_length() - 1
            b += tz
            out.append(oid_of[b])
            mask >>= tz + 1
            b += 1
        return tuple(sorted(out))

    def __len__(self) -> int:
        return len(self._oid_of)


@dataclass
class State:
    """A state ``(ID_s, F_s)`` with its Marked Frame Set.

    ``frames`` is kept sorted ascending.  Of the Marked Frame Set only
    the **newest** mark is materialised (``mark``; ``-1`` = none):
    frames expire oldest-first, so a state is valid exactly while its
    newest key frame is inside the window — keeping older marks would
    never change a pruning decision (Theorems 1/4; the differential
    tests assert the newest mark equals the brute-force validity
    threshold).  Mark-set union from the paper's marking rules becomes
    ``max``.  Frames are not eagerly expired — SSG prunes lazily on
    visit — so read accessors take the window low bound ``lo``.
    """

    objset: int
    frames: list[int] = field(default_factory=list)
    mark: int = -1

    def expire(self, lo: int) -> None:
        """Drop frames with fid < ``lo`` (window slide)."""
        fr = self.frames
        if fr and fr[0] < lo:
            del fr[: bisect_left(fr, lo)]

    def is_valid(self, lo: int) -> bool:
        """Valid iff the newest mark is inside the window (Thm 1/4)."""
        return self.mark >= lo

    def n_live_frames(self, lo: int) -> int:
        """``|F_s ∩ window|`` without mutating the state."""
        fr = self.frames
        if not fr or fr[0] >= lo:
            return len(fr)
        return len(fr) - bisect_left(fr, lo)

    def live_frames(self, lo: int) -> list[int]:
        fr = self.frames
        if not fr or fr[0] >= lo:
            return list(fr)
        return fr[bisect_left(fr, lo) :]

    def append_frame(self, fid: int) -> None:
        """Append ``fid`` (must be >= every stored fid) exactly once."""
        fr = self.frames
        if not fr or fr[-1] != fid:
            fr.append(fid)


def merge_sorted_unique(lists: list[list[int]]) -> list[int]:
    """Union of sorted int lists, as a sorted list.

    Frame sets of a generated state are the union over all its
    generator states (the paper's ``merge``), which keeps ``F_s`` equal
    to the full set of window frames containing ``ID_s``.
    """
    if len(lists) == 1:
        return list(lists[0])
    seen: set[int] = set()
    for li in lists:
        seen.update(li)
    return sorted(seen)


class Window:
    """Window arithmetic helper shared by all generators."""

    def __init__(self, w: int, d: int) -> None:
        if w <= 0:
            raise ValueError(f"window size must be positive, got {w}")
        if not (0 <= d <= w):
            raise ValueError(f"duration must satisfy 0 <= d <= w, got d={d} w={w}")
        self.w = w
        self.d = d

    def lo(self, fid: int) -> int:
        """Lowest fid inside the window ending at ``fid``."""
        return fid - self.w + 1


def iter_frames(frames: Iterable[tuple[int, Iterable[int]]]) -> Iterator[tuple[int, list[int]]]:
    """Normalize a frame stream to ``(fid, [oid, ...])`` and check order."""
    last = None
    for fid, oids in frames:
        fid = int(fid)
        if last is not None and fid <= last:
            raise ValueError(f"frames must arrive in strictly increasing fid order: {fid} after {last}")
        last = fid
        yield fid, list(oids)
