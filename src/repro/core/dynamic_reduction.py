"""Dynamic reduction (paper §5, Algorithm 7) on bitmask subproblems.

Applied at entry of every recursion frame ``(R, P, X)``:

1. *Mark pass*: ``M`` = candidates with at least one forbidden neighbor
   (one sweep over ``X``, Lemma 7's cheap precondition).
2. *Degree-0 / relaxed degree-1 pass* (Lemmas 5 and 7): one scan over ``P``
   against the **current** shrinking candidate set — each rule application is
   a sound rewrite of the current subproblem, so cascading removals within
   the pass are valid.
3. *Degree-(|P|−1) hoist* (Lemma 8): all vertices adjacent to every other
   remaining candidate (they are mutually adjacent by construction) move
   into ``R`` together; ``X ← X ∩ N(R')`` (Algorithm 7 line 15).

Base-case subtlety (not spelled out in the paper, required for
correctness): a vertex removed from ``P`` by rule 2 is adjacent to all of
``R``, so if the frame afterwards bottoms out with ``P = X = ∅`` the plain
``R ∪ D`` report must be suppressed whenever some removed vertex is adjacent
to all of the hoisted set ``D`` (it would extend the reported clique). The
frame owner performs that check with the returned ``rem``/``hoisted`` masks;
deeper frames are provably unaffected (DESIGN.md §2.2, exhaustively covered
by the engine-vs-bruteforce test battery).
"""
from __future__ import annotations

from ..mce.bitgraph import iter_bits


def dynamic_reduce(
    adj: list[int],
    ids: list[int],
    R: list[int],
    P: int,
    X: int,
    report,
) -> tuple[list[int], int, int, int, int]:
    """Reduce one frame. Returns ``(R', P', X', rem_mask, hoisted_mask)``.

    ``report`` receives complete maximal cliques (lists of global ids) found
    by the degree-0/degree-1 rules. ``R`` is not mutated in place.
    """
    # Pass 0: mark candidates that have a forbidden neighbor.
    marked = 0
    x = X
    while x:
        low = x & -x
        x ^= low
        marked |= adj[low.bit_length() - 1]
    marked &= P

    rem = 0
    p1 = P
    counts: list[tuple[int, int]] = []  # (bit index, pass-1 degree)
    scan = P
    while scan:
        low = scan & -scan
        scan ^= low
        if not (p1 & low):
            continue  # removed earlier in this pass
        u = low.bit_length() - 1
        nb = adj[u] & p1
        cnt = nb.bit_count()
        counts.append((u, cnt))
        if cnt == 0:
            # Lemma 5: remove; report R∪{u} iff u has no forbidden neighbor.
            if not (marked & low):
                report(R + [ids[u]])
            p1 ^= low
            rem |= low
        elif cnt == 1:
            # Lemma 7 (relaxed): fire iff u or its neighbor is unmarked.
            if (not (marked & low)) or (not (marked & nb)):
                v = nb.bit_length() - 1
                report(R + [ids[u], ids[v]])
                p1 ^= low
                rem |= low
                # If v was also dynamic degree-1 before u's removal, drop it
                # too (it cannot head any further maximal clique).
                if (adj[v] & (p1 | low)) == low:
                    p1 ^= nb
                    rem |= nb

    # Pass 2: hoist dynamic degree-(|P|-1) vertices into R (Lemma 8).
    hoisted = 0
    pcnt = p1.bit_count()
    if pcnt:
        if rem == 0:
            # nothing removed: pass-1 degrees are still exact — reuse them
            for u, cnt in counts:
                if cnt == pcnt - 1:
                    hoisted |= 1 << u
        else:
            scan = p1
            while scan:
                low = scan & -scan
                scan ^= low
                u = low.bit_length() - 1
                if (adj[u] & p1).bit_count() == pcnt - 1:
                    hoisted |= low
    if hoisted:
        r2 = list(R)
        x2 = X
        for u in iter_bits(hoisted):
            r2.append(ids[u])
            x2 &= adj[u]
        return r2, p1 & ~hoisted, x2, rem, hoisted
    return R, p1, X, rem, hoisted
