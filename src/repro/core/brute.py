"""From-definition oracle for MCOS generation (tests only).

For a concrete window (a list of ``(fid, objset-mask)`` pairs) the
family of valid states is exactly the family of *closed* object sets:
``X`` such that ``X == intersection of O_f over all window frames f
containing X``, each paired with its full supporting frame set.  This
module enumerates that family directly from Definition 1/2, with no
incremental cleverness, so the production algorithms (NAIVE / MFS /
SSG) can be diffed against it frame by frame.
"""
from __future__ import annotations


def closed_states(window_frames: list[tuple[int, int]]) -> dict[int, list[int]]:
    """All valid states of a window.

    Parameters
    ----------
    window_frames:
        ``(fid, mask)`` pairs for every frame currently in the window,
        in ascending fid order.  Frames with empty object sets
        contribute nothing (an MCOS is non-empty by Definition 1).

    Returns
    -------
    dict mask -> sorted list of supporting fids
        One entry per closed (valid) object set; the frame list is
        every window frame whose object set contains the mask.
    """
    family: set[int] = set()
    for _, mask in window_frames:
        if not mask:
            continue
        new = {mask}
        for x in family:
            inter = x & mask
            if inter:
                new.add(inter)
        family |= new
    out: dict[int, list[int]] = {}
    for x in family:
        out[x] = [fid for fid, mask in window_frames if mask & x == x]
    return out


def satisfied_states(
    window_frames: list[tuple[int, int]], d: int
) -> dict[int, list[int]]:
    """Valid states whose support meets the duration threshold ``d``."""
    return {
        x: fids
        for x, fids in closed_states(window_frames).items()
        if len(fids) >= d
    }


def validity_threshold(window_frames: list[tuple[int, int]], objset: int) -> int | None:
    """Newest frame ``f*`` such that the suffix of ``objset``'s support
    from ``f*`` onward still intersects to exactly ``objset``.

    This is the ground truth for mark exactness: a state's newest mark
    must sit on ``f*`` (the state dies exactly when ``f*`` expires).
    Returns ``None`` when ``objset`` is not valid in this window at all.
    """
    support = [(fid, m) for fid, m in window_frames if m & objset == objset]
    best = None
    for i in range(len(support)):
        inter = ~0
        for _, m in support[i:]:
            inter &= m
        if inter == objset:
            best = support[i][0]
    return best
