"""OpGen: Reduct and Augment transitions as bitmap flips (paper §3, §5).

ApxMODis's OpGen "explores all one-flip transitions in s.L" (Alg. 1):
Reduct ⊖ flips one 1→0 — dropping a whole attribute (presence bit) or
removing the tuples of one value cluster (a literal A=a, paper §3
Reduct (a)-(b)). The bi-directional variant's backward OpGen generates
Augment ⊕ transitions, flipping 0→1 — adding an attribute from a source
schema or inserting the tuples of a cluster with null-fill on unknown
cells (paper §3 Augment (a)-(c); null-fill falls out of the outer-join
universal table).

Flip validity: a value-cluster bit can only change while its
attribute's presence bit is 1 (literals are defined on R_M.A, §3); a
presence flip to 0 retires that attribute's cluster bits; flipping a
presence bit to 1 restores all of its cluster bits (the attribute
arrives with its full active domain, adom_s(A) = '_').
"""
from __future__ import annotations

from typing import Iterator

from repro.core.literals import Bits, UnitLayout


def reduct_children(layout: UnitLayout, bits: Bits) -> Iterator[tuple[Bits, str]]:
    """All one-Reduct successors of ``bits`` (forward search)."""
    for a in layout.attrs:
        cu = layout.col_unit[a]
        if bits[cu] == 1:
            child = list(bits)
            child[cu] = 0
            for u in layout.val_units[a]:
                child[u] = 0
            yield tuple(child), f"⊖ drop {a}"
            units = layout.val_units[a]
            active = [u for u in units if bits[u] == 1]
            for u in active:
                # removing the last cluster of an attribute is expressed
                # as dropping the attribute instead, avoiding an
                # all-null column (already generated above).
                if len(active) == 1:
                    continue
                child = list(bits)
                child[u] = 0
                yield tuple(child), f"⊖ {layout.unit_names[u]}"


def augment_children(layout: UnitLayout, bits: Bits) -> Iterator[tuple[Bits, str]]:
    """All one-Augment successors of ``bits`` (backward search)."""
    for a in layout.attrs:
        cu = layout.col_unit[a]
        if bits[cu] == 0:
            child = list(bits)
            child[cu] = 1
            for u in layout.val_units[a]:
                child[u] = 1
            yield tuple(child), f"⊕ add {a}"
        else:
            for u in layout.val_units[a]:
                if bits[u] == 0:
                    child = list(bits)
                    child[u] = 1
                    yield tuple(child), f"⊕ {layout.unit_names[u]}"
