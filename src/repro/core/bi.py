"""BiMODis / NOBiMODis: bi-directional skyline search with
correlation-based pruning (Alg. 2 / Fig. 12, §5.3).

Forward frontier: Reduct flips from the universal state s_U. Backward
frontier: Augment flips from the BackSt seed — a minimal dataset whose
partition-attribute clusters cover every target class ("no classes will
be 'missed' in dataset D_b", §5.3).

Correlation-based pruning (Lemma 4): a Spearman correlation graph G_C
over the valuated tests T links measures that are strongly correlated
(|ρ| ≥ θ) with each other and with dataset size. CorrFP parameterizes
an unvaluated state's measures with ranges interpolated from the
nearest recorded states by retained-row fraction (Fig. 12 Case 2); a
state whose parameterized vector is (1+ε)-covered by a current skyline
entry is pruned without valuation — the monotonicity condition is
carried by the interpolated bounds. NOBiMODis is the same engine with
pruning disabled.
"""
from __future__ import annotations

from typing import Callable

import numpy as np

from repro.core.dominance import Vec
from repro.core.literals import Bits
from repro.core.operators import augment_children, reduct_children
from repro.core.runner import ParetoTable, SearchContext, SearchResult, timed

# A parameterized performance entry: exact value or [lo, hi] range.
ParamPerf = list[tuple[float, float]]


# -- BackSt (procedure BackSt, §5.3) ------------------------------------

def back_start(ctx: SearchContext, base_attrs: list[str] | None = None) -> Bits:
    """Backward seed s_b: base-schema attributes only, with a minimal
    cluster cover of the target's active domain on the partition
    attribute (the present attribute with the most clusters)."""
    layout = ctx.layout
    attrs = [a for a in (base_attrs or layout.attrs) if a in layout.col_unit]
    bits = list(layout.empty_bits())
    for a in attrs:
        bits[layout.col_unit[a]] = 1
        for u in layout.val_units[a]:
            bits[u] = 1
    part = max(attrs, key=lambda a: layout.n_clusters(a), default=None)
    if part is None or layout.n_clusters(part) < 2:
        return tuple(bits)
    # Greedy set cover of target classes by clusters of the partition attr.
    target = ctx.universal_pdf[ctx.task.target]
    tv = target.to_numpy()
    if np.issubdtype(tv.dtype, np.floating) and len(np.unique(tv[~np.isnan(tv.astype(float))])) > 10:
        tv = np.digitize(
            tv, np.nanquantile(tv.astype(float), [0.25, 0.5, 0.75])
        )
    lab = layout.row_clusters[part]
    classes = set(np.unique(tv[lab >= 0]).tolist())
    chosen: list[int] = []
    covered: set = set()
    cluster_classes = {
        j: set(np.unique(tv[lab == j]).tolist())
        for j in range(layout.n_clusters(part))
    }
    while covered != classes:
        best = max(
            cluster_classes,
            key=lambda j: len(cluster_classes[j] - covered),
            default=None,
        )
        if best is None or not (cluster_classes[best] - covered):
            break
        chosen.append(best)
        covered |= cluster_classes.pop(best)
    for j, u in enumerate(layout.val_units[part]):
        bits[u] = 1 if j in chosen else 0
    return tuple(bits)


# -- correlation machinery ----------------------------------------------

def spearman(x: np.ndarray, y: np.ndarray) -> float:
    """Spearman rank correlation (ties by average rank via argsort)."""
    if len(x) < 3 or np.std(x) == 0 or np.std(y) == 0:
        return 0.0
    rx = np.argsort(np.argsort(x)).astype(float)
    ry = np.argsort(np.argsort(y)).astype(float)
    cx, cy = rx - rx.mean(), ry - ry.mean()
    d = np.sqrt((cx**2).sum() * (cy**2).sum())
    return float((cx * cy).sum() / d) if d > 0 else 0.0


class CorrPruner:
    """G_C + CorrFP + the Lemma-4 prune test, refreshed as T grows."""

    def __init__(self, ctx: SearchContext, theta: float = 0.8):
        self.ctx = ctx
        self.theta = theta
        self._obs: list[tuple[float, Vec]] = []  # (frac_rows, perf vector)
        self._corr_with_size: np.ndarray | None = None
        self.n_pruned = 0

    def observe(self, bits: Bits, vec: Vec) -> None:
        frac = self.ctx.layout.approx_n_rows(bits) / max(
            1, self.ctx.layout.n_rows
        )
        self._obs.append((frac, vec))
        if len(self._obs) % 8 == 0:
            self._refresh()

    def _refresh(self) -> None:
        fr = np.array([o[0] for o in self._obs])
        P = np.array([o[1] for o in self._obs])
        self._corr_with_size = np.array(
            [spearman(fr, P[:, j]) for j in range(P.shape[1])]
        )

    def corr_fp(self, bits: Bits) -> ParamPerf | None:
        """Parameterized performance vector from G_C and T (Fig. 12).

        Per measure: a tight [lo, hi] interpolated from the two
        recorded states bracketing this state's retained-row fraction
        when that measure is strongly size-correlated (Case 2), else
        the observed range over all of T (the generic [p̂_l, p̂_u] of
        §5.3). None when the correlation evidence is too weak overall.
        """
        if self._corr_with_size is None or len(self._obs) < 6:
            return None
        strong = np.abs(self._corr_with_size) >= self.theta
        if not strong.any():
            return None
        frac = self.ctx.layout.approx_n_rows(bits) / max(
            1, self.ctx.layout.n_rows
        )
        obs = sorted(self._obs, key=lambda o: o[0])
        fr = np.array([o[0] for o in obs])
        P = np.array([o[1] for o in obs])
        g_lo, g_hi = P.min(axis=0), P.max(axis=0)
        lo_i = int(np.searchsorted(fr, frac, side="right")) - 1
        hi_i = lo_i + 1
        bracket = 0 <= lo_i and hi_i < len(obs)
        out: ParamPerf = []
        for j in range(P.shape[1]):
            if strong[j] and bracket:
                a, b = P[lo_i, j], P[hi_i, j]
                out.append((float(min(a, b)), float(max(a, b))))
            else:
                out.append((float(g_lo[j]), float(g_hi[j])))
        return out

    def can_prune(self, param: ParamPerf, table: ParetoTable, eps: float) -> bool:
        """True iff some skyline entry parameterized-ε-dominates ``param``
        (then, by the monotonicity of the interpolated bounds along the
        path, the state and its extensions cannot enter the ε-skyline)."""
        for _, v in table.entries():
            if all(
                v[j] <= (1 + eps) * param[j][0] for j in range(len(v))
            ) and any(v[j] <= param[j][0] for j in range(len(v))):
                self.n_pruned += 1
                return True
        return False


# -- the bi-directional engine ------------------------------------------

def bi_engine(
    ctx: SearchContext,
    *,
    N: int,
    eps: float,
    max_level: int,
    prune: bool,
    theta: float = 0.8,
    base_attrs: list[str] | None = None,
    level_hook: Callable[[ParetoTable, int], None] | None = None,
    calibrate_k: int = 3,
) -> tuple[ParetoTable, int, int]:
    """Shared by BiMODis / NOBiMODis / DivMODis. Returns
    (pareto table, #spawned, #pruned). After each level the per-measure
    champions are true-valuated and E refreshed (runtime T enrichment).
    """
    layout = ctx.layout
    if base_attrs is None and ctx.base_attrs:
        base_attrs = ctx.base_attrs
    table = ParetoTable(ctx.measures, eps)
    pruner = CorrPruner(ctx, theta=theta)

    s_u = layout.full_bits()
    s_b = back_start(ctx, base_attrs)
    for s in (s_u, s_b):
        v = ctx.valuate(s)
        table.offer(s, v)
        pruner.observe(s, v)
    seen: set[Bits] = {s_u, s_b}
    seen_f: set[Bits] = {s_u}
    seen_b: set[Bits] = {s_b}
    frontier_f: list[tuple[Bits, Vec]] = [(s_u, ctx.valuate(s_u))]
    frontier_b: list[tuple[Bits, Vec]] = [(s_b, ctx.valuate(s_b))]
    spawned = 2

    for level in range(max_level):
        if not frontier_f and not frontier_b:
            break
        if seen_f & seen_b - {s_u, s_b}:
            break  # "when a path is formed, the result D_F is returned"
        next_f: list[tuple[Bits, Vec]] = []
        next_b: list[tuple[Bits, Vec]] = []
        # Best-decisive-first expansion within the level.
        for frontier, gen, nxt, side in (
            (sorted(frontier_f, key=lambda e: e[1][-1]), reduct_children, next_f, seen_f),
            (sorted(frontier_b, key=lambda e: e[1][-1]), augment_children, next_b, seen_b),
        ):
            for s, _v in frontier:
                if len(seen) >= N:
                    break
                for child, _op in gen(layout, s):
                    if child in seen:
                        continue
                    if prune:
                        param = pruner.corr_fp(child)
                        if param is not None and pruner.can_prune(
                            param, table, eps
                        ):
                            seen.add(child)
                            side.add(child)
                            continue
                    seen.add(child)
                    side.add(child)
                    spawned += 1
                    cvec = ctx.valuate(child)
                    table.offer(child, cvec)
                    pruner.observe(child, cvec)
                    nxt.append((child, cvec))
                    if len(seen) >= N:
                        break
        frontier_f, frontier_b = next_f, next_b
        ctx.calibrate(table.entries(), k=calibrate_k)
        if level_hook is not None:
            level_hook(table, level)
        if len(seen) >= N:
            break
    return table, spawned, pruner.n_pruned


def bi_modis(
    ctx: SearchContext,
    *,
    N: int = 300,
    eps: float = 0.1,
    max_level: int = 6,
    prune: bool = True,
    theta: float = 0.8,
    base_attrs: list[str] | None = None,
) -> SearchResult:
    """BiMODis (prune=True) / NOBiMODis (prune=False)."""

    def run():
        return bi_engine(
            ctx,
            N=N,
            eps=eps,
            max_level=max_level,
            prune=prune,
            theta=theta,
            base_attrs=base_attrs,
        )

    (table, spawned, _npruned), wall = timed(run)
    return SearchResult(
        method="BiMODis" if prune else "NOBiMODis",
        skyline=table.result(),
        n_valuations=spawned,
        n_spawned=spawned,
        wall_time=wall,
    )
