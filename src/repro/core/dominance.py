"""Dominance relations, the (1+ε)-position grid, and Kung's algorithm.

All vectors here are *normalized, minimized* measure tuples (paper §2):
``u`` dominates ``v`` iff u ≤ v componentwise with at least one strict
inequality (§4); ``u`` ε-dominates ``v`` iff u ≤ (1+ε)·v componentwise
and u ≤ v on at least one decisive measure (§5.1). ``position``
implements Eq. (1): the floor-log_(1+ε) grid cell over the first |P|−1
measures, with the last measure decisive by default. ``kung_skyline``
is the classic divide-and-conquer maxima algorithm [24] used by the
exact fixed-parameter baseline of Theorem 1 and by tests to check
UPareto's output.
"""
from __future__ import annotations

import math
from typing import Sequence

Vec = tuple[float, ...]


def dominates(u: Vec, v: Vec) -> bool:
    """True iff u dominates v (minimize; §4)."""
    return all(a <= b for a, b in zip(u, v)) and any(a < b for a, b in zip(u, v))


def eps_dominates(u: Vec, v: Vec, eps: float) -> bool:
    """True iff u ε-dominates v (§5.1): u ≤ (1+ε)v all, u ≤ v somewhere."""
    return all(a <= (1 + eps) * b for a, b in zip(u, v)) and any(
        a <= b for a, b in zip(u, v)
    )


def position(vec: Vec, lowers: Sequence[float], eps: float) -> tuple[int, ...]:
    """Eq. (1): discretized cell over the first |P|−1 measures."""
    out = []
    for p, pl in zip(vec[:-1], lowers[:-1]):
        ratio = max(p, pl) / pl
        out.append(int(math.floor(math.log(ratio, 1 + eps) + 1e-12)))
    return tuple(out)


def kung_skyline(vectors: list[Vec]) -> list[int]:
    """Indices of the exact skyline (non-dominated set) of ``vectors``.

    Kung/Luccio/Preparata divide-and-conquer on the first coordinate;
    O(n log n) for 2–3 measures, O(n log^(d−2) n) beyond — matching the
    cost cited in Theorem 1's FPT argument.
    """
    n = len(vectors)
    if n == 0:
        return []
    order = sorted(range(n), key=lambda i: vectors[i])

    def solve(idx: list[int]) -> list[int]:
        if len(idx) <= 1:
            return list(idx)
        mid = len(idx) // 2
        left = solve(idx[:mid])   # better on first coordinate
        right = solve(idx[mid:])
        keep = list(left)
        for r in right:
            if not any(dominates(vectors[l], vectors[r]) for l in left):
                keep.append(r)
        return keep

    sky = solve(order)
    # Remove exact duplicates dominated by nothing but identical twins.
    seen: dict[Vec, int] = {}
    out = []
    for i in sorted(sky):
        v = vectors[i]
        if v not in seen:
            seen[v] = i
            out.append(i)
    return out
