"""OpGen transition tests: Reduct/Augment flip validity and inverseness."""
import numpy as np
import pandas as pd
import pytest

from repro.core.literals import UnitLayout
from repro.core.operators import augment_children, reduct_children


@pytest.fixture(scope="module")
def layout():
    rng = np.random.default_rng(0)
    pdf = pd.DataFrame(
        {
            "key": np.arange(60),
            "target": rng.integers(0, 2, 60),
            "g": rng.integers(0, 4, 60),  # low-cardinality -> value units
            "x": rng.normal(size=60),  # continuous -> presence only
            "y": rng.normal(size=60),
        }
    )
    return UnitLayout.from_universal(pdf, protected={"key", "target"}, max_k=6)


def test_reduct_counts_from_full(layout):
    kids = list(reduct_children(layout, layout.full_bits()))
    # 3 column drops + 4 grp cluster flips
    assert len(kids) == 3 + 4
    assert len({b for b, _ in kids}) == len(kids)  # all distinct


def test_reduct_flips_exactly_one_semantic_unit(layout):
    full = layout.full_bits()
    for child, op in reduct_children(layout, full):
        diff = [i for i in range(layout.n_units) if child[i] != full[i]]
        if op.startswith("⊖ drop"):
            # presence bit + all its cluster bits retire together
            assert layout.col_unit[op.split()[-1]] in diff
        else:
            assert len(diff) == 1


def test_reduct_never_removes_last_cluster(layout):
    bits = list(layout.full_bits())
    # deactivate all but one grp cluster
    for u in layout.val_units["g"][1:]:
        bits[u] = 0
    kids = list(reduct_children(layout, tuple(bits)))
    # the surviving cluster bit must not be offered as a flip
    last = layout.val_units["g"][0]
    assert all(child[last] == 1 or child[layout.col_unit["g"]] == 0 for child, _ in kids)


def test_augment_counts_from_empty(layout):
    kids = list(augment_children(layout, layout.empty_bits()))
    assert len(kids) == 3  # one column-add per attribute


def test_augment_restores_full_domain(layout):
    empty = layout.empty_bits()
    for child, op in augment_children(layout, empty):
        if "add g" in op:
            assert all(child[u] == 1 for u in layout.val_units["g"])


def test_augment_cluster_flip_requires_presence(layout):
    bits = list(layout.full_bits())
    bits[layout.val_units["g"][0]] = 0
    kids = list(augment_children(layout, tuple(bits)))
    # only the missing cluster can be re-added (all columns present)
    assert len(kids) == 1
    child, op = kids[0]
    assert child == layout.full_bits()


def test_reduct_then_augment_roundtrip(layout):
    full = layout.full_bits()
    for child, op in reduct_children(layout, full):
        if op.startswith("⊖ val") or "=" in op:
            back = [b for b, _ in augment_children(layout, child)]
            assert full in back


def test_no_transition_from_all_zero_reduct(layout):
    assert list(reduct_children(layout, layout.empty_bits())) == []


def test_no_transition_from_full_augment(layout):
    assert list(augment_children(layout, layout.full_bits())) == []


def test_transitions_are_monotone(layout):
    """Reduct only clears bits; Augment only sets bits."""
    full = layout.full_bits()
    for child, _ in reduct_children(layout, full):
        assert all(c <= p for c, p in zip(child, full))
    empty = layout.empty_bits()
    for child, _ in augment_children(layout, empty):
        assert all(c >= p for c, p in zip(child, empty))
