"""DivMODis: the Eq. (2) diversification score, the greedy swap, and
the full algorithm."""
import numpy as np
import pytest

from repro.core.div import _dis, div_modis, div_score, diversify


def _entries(n, d=3, seed=0):
    rng = np.random.default_rng(seed)
    out = []
    for i in range(n):
        bits = tuple(rng.integers(0, 2, 8).tolist())
        vec = tuple(rng.uniform(0.05, 1.0, d))
        out.append((bits, vec))
    return out


def test_dis_symmetric_and_nonnegative():
    a, b = _entries(2, seed=1)
    assert _dis(a, b, 0.5, 1.0) == pytest.approx(_dis(b, a, 0.5, 1.0))
    assert _dis(a, b, 0.5, 1.0) >= 0


def test_dis_zero_for_identical():
    e = _entries(1, seed=2)[0]
    assert _dis(e, e, 0.5, 1.0) == pytest.approx(0.0, abs=1e-9)


def test_dis_alpha_extremes():
    a = ((1, 1, 0, 0), (0.2, 0.2))
    b = ((1, 1, 0, 0), (0.9, 0.9))  # same bitmap, different perf
    assert _dis(a, b, alpha=1.0, euc_m=1.0) == pytest.approx(0.0, abs=1e-9)
    assert _dis(a, b, alpha=0.0, euc_m=1.0) > 0


def test_div_score_monotone_under_superset():
    es = _entries(6, seed=3)
    assert div_score(es, 0.5, 1.0) >= div_score(es[:4], 0.5, 1.0)


def test_diversify_returns_at_most_k():
    es = _entries(10, seed=4)
    out = diversify(es, k=4, alpha=0.5)
    assert len(out) == 4
    assert all(e in es for e in out)


def test_diversify_small_input_passthrough():
    es = _entries(3, seed=5)
    assert diversify(es, k=5, alpha=0.5) == es


def test_diversify_improves_over_random_seed():
    es = _entries(12, seed=6)
    euc_m = max(
        float(np.linalg.norm(np.asarray(a[1]) - np.asarray(b[1])))
        for i, a in enumerate(es)
        for b in es[i + 1 :]
    )
    rng = np.random.default_rng(0)
    idx = list(rng.choice(len(es), size=4, replace=False))
    random_pool = [es[i] for i in idx]
    out = diversify(es, k=4, alpha=0.5, seed=0)
    assert div_score(out, 0.5, euc_m) >= div_score(random_pool, 0.5, euc_m) - 1e-12


def test_diversify_deterministic():
    es = _entries(10, seed=7)
    assert diversify(es, 4, 0.5, seed=3) == diversify(es, 4, 0.5, seed=3)


def test_div_modis_respects_k(house_ctx):
    res = div_modis(house_ctx, N=80, eps=0.2, max_level=4, k=3)
    assert res.method == "DivMODis"
    assert 1 <= len(res.skyline) <= 3 + 1  # +1: final level may add cells


@pytest.mark.parametrize("alpha", [0.1, 0.9])
def test_div_modis_alpha_variants_run(house_ctx, alpha):
    res = div_modis(house_ctx, N=50, eps=0.3, max_level=3, k=3, alpha=alpha)
    assert res.skyline
