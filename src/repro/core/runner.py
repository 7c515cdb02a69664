"""Configuration C and the valuation machinery shared by all MODis
algorithms (paper §3 "Running", §5.1 UPareto).

``SearchContext`` is the configuration C = (s_U, O, M, T, E): it owns
the collected universal table, the unit layout, the task (model M), the
measure set P, the test cache T of true valuations, and the MO-GBM
estimator E seeded from a sample of states — so a search valuates most
states with a single estimator call, as the paper prescribes.

``ParetoTable`` is procedure UPareto: the (1+ε)-log position grid with
per-cell replacement on the decisive measure (last measure of P by
default, §5.1), plus the p_u upper-bound early skip.
"""
from __future__ import annotations

import time
from dataclasses import dataclass, field

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession

from repro.core.dominance import Vec, kung_skyline, position
from repro.core.literals import Bits, UnitLayout
from repro.core.operators import reduct_children
from repro.core.universal import collect_universal
from repro.core.state import materialize_pandas
from repro.estimator.mogbm import MOGBMEstimator, state_features
from repro.lake.tasks import Lake
from repro.measures import Measure, PerfVector
from repro.tasks import TabularTask


@dataclass
class SearchContext:
    layout: UnitLayout
    universal_pdf: pd.DataFrame
    task: TabularTask
    measures: list[Measure]
    estimator: MOGBMEstimator | None = None
    tests: dict[Bits, PerfVector] = field(default_factory=dict)
    est_cache: dict[Bits, tuple] = field(default_factory=dict)
    n_valuations: int = 0  # estimator + true-model valuations performed
    base_attrs: list[str] = field(default_factory=list)

    # -- construction ----------------------------------------------------
    @classmethod
    def build(
        cls,
        spark: SparkSession,
        lake: Lake,
        task: TabularTask,
        measures: list[Measure],
        *,
        max_k: int = 12,
        force_cluster: tuple[str, ...] = (),
        use_estimator: bool = True,
        n_seed: int = 24,
        seed: int = 0,
    ) -> "SearchContext":
        pdf = collect_universal(lake)
        layout = UnitLayout.from_universal(
            pdf,
            protected=task.protected_cols(),
            max_k=max_k,
            force_cluster=force_cluster,
            seed=seed,
        )
        ctx = cls(
            layout=layout,
            universal_pdf=pdf,
            task=task,
            measures=list(measures),
            base_attrs=[
                c for c in lake.base.columns if c not in task.protected_cols()
            ],
        )
        if use_estimator:
            ctx.seed_estimator(n_seed=n_seed, seed=seed)
        return ctx

    # -- materialization -------------------------------------------------
    def materialize(self, bits: Bits) -> pd.DataFrame:
        return materialize_pandas(
            self.universal_pdf, self.layout, bits, keep=self.task.keep_cols()
        )

    # -- valuation -------------------------------------------------------
    def true_eval(self, bits: Bits) -> PerfVector:
        """Train/evaluate the actual model M on the state's dataset."""
        if bits in self.tests:
            return self.tests[bits]
        raw = self.task.evaluate(self.materialize(bits))
        pv = PerfVector.from_raw(raw, self.measures)
        self.tests[bits] = pv
        self.n_valuations += 1
        return pv

    def valuate(self, bits: Bits) -> Vec:
        """Normalized performance vector via T, else E, else M (§3 (2))."""
        if bits in self.tests:
            return self.tests[bits].vector(self.measures)
        if self.estimator is not None and self.estimator.fitted:
            if bits not in self.est_cache:
                v = self.estimator.predict(state_features(self.layout, bits))
                self.est_cache[bits] = tuple(float(x) for x in np.atleast_1d(v))
                self.n_valuations += 1
            return self.est_cache[bits]
        return self.true_eval(bits).vector(self.measures)

    # -- estimator seeding & online refresh ------------------------------
    def seed_estimator(
        self, *, n_seed: int = 24, max_single_flips: int = 64, seed: int = 0
    ) -> None:
        """Fit MO-GBM E on true valuations of a structured state sample.

        The sample contains (1) the universal state, (2) every single-
        Reduct child of it (capped) — so the surrogate observes each
        unit's marginal effect, (3) ``n_seed`` random deeper Reduct
        states spanning sparse datasets, and (4) a minimal base-schema
        state, covering the backward frontier's regime. This is the
        "historically observed performance of M (denoted as T)" the
        paper's estimator learns from (§2 Estimators).
        """
        rng = np.random.default_rng(seed)
        full = self.layout.full_bits()
        states: list[Bits] = [full]
        singles = [b for b, _ in reduct_children(self.layout, full)]
        if len(singles) > max_single_flips:
            keep = rng.choice(len(singles), size=max_single_flips, replace=False)
            singles = [singles[i] for i in sorted(keep)]
        states.extend(singles)
        depths = rng.integers(2, max(3, self.layout.n_units // 2), n_seed)
        for d in depths:
            bits = full
            for _ in range(int(d)):
                kids = [b for b, _ in reduct_children(self.layout, bits)]
                if not kids:
                    break
                bits = kids[rng.integers(0, len(kids))]
            states.append(bits)
        if self.base_attrs:
            mini = list(self.layout.empty_bits())
            for a in self.base_attrs:
                if a in self.layout.col_unit:
                    mini[self.layout.col_unit[a]] = 1
                    for u in self.layout.val_units[a]:
                        mini[u] = 1
            states.append(tuple(mini))
        states = list(dict.fromkeys(states))
        for b in states:
            self.true_eval(b)
        self.refresh_estimator()

    def refresh_estimator(self) -> None:
        """(Re)fit E on the whole test cache T; invalidate predictions."""
        X = np.array([state_features(self.layout, b) for b in self.tests])
        Y = np.array([pv.vector(self.measures) for pv in self.tests.values()])
        est = MOGBMEstimator(self.measures)
        est.fit(X, Y)
        self.estimator = est
        self.est_cache.clear()

    def calibrate(self, entries: list[tuple[Bits, Vec]], k: int = 2) -> int:
        """True-evaluate up to ``k`` promising entries not yet in T and
        refresh E — the paper's runtime enrichment of T (§3 Running)."""
        if not entries:
            return 0
        # Per-measure champions first, then the decisive ordering.
        cands: list[tuple[Bits, Vec]] = [
            min(entries, key=lambda e: e[1][j]) for j in range(len(self.measures))
        ] + sorted(entries, key=lambda e: e[1][-1])
        done = 0
        for bits, _ in cands:
            if bits not in self.tests:
                self.true_eval(bits)
                done += 1
                if done >= k:
                    break
        # Only refresh when a surrogate is in play: an estimator-free
        # configuration (exact valuation) must stay exact.
        if done and self.estimator is not None:
            self.refresh_estimator()
        return done


class ParetoTable:
    """Procedure UPareto (Alg. 1 lines 20–30) over the ε-position grid."""

    def __init__(self, measures: list[Measure], eps: float):
        self.measures = measures
        self.eps = eps
        self.lowers = [m.lo for m in measures]
        self.cells: dict[tuple, tuple[Bits, Vec]] = {}

    def offer(self, bits: Bits, vec: Vec) -> bool:
        """Insert/replace per Eq. (1) cell; False if skipped or beaten."""
        for m, v in zip(self.measures, vec):
            if v > m.hi:  # early skip on the user upper bound p_u
                return False
        pos = position(vec, self.lowers, self.eps)
        held = self.cells.get(pos)
        if held is None or vec[-1] < held[1][-1]:  # decisive = last measure
            self.cells[pos] = (bits, vec)
            return True
        return False

    def entries(self) -> list[tuple[Bits, Vec]]:
        return list(self.cells.values())

    def result(self) -> list[tuple[Bits, Vec]]:
        """Cell winners, cleaned of exact dominance (skyline property 2)."""
        ent = self.entries()
        keep = kung_skyline([v for _, v in ent])
        return [ent[i] for i in keep]


@dataclass
class SearchResult:
    method: str
    skyline: list[tuple[Bits, Vec]]
    n_valuations: int
    n_spawned: int
    wall_time: float

    def best_by(self, measure_idx: int) -> tuple[Bits, Vec]:
        """The skyline entry minimizing one normalized measure — the
        paper's per-table selection rule ('the table in the Skyline set
        with the best estimated <first metric>')."""
        return min(self.skyline, key=lambda e: e[1][measure_idx])


def timed(fn):
    """Run ``fn()`` and return (result, wall_seconds)."""
    t0 = time.perf_counter()
    out = fn()
    return out, time.perf_counter() - t0
