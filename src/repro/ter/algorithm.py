"""The online TER-iDS operator and baseline runners (paper Algorithms 1-2).

``prepare`` runs the offline pre-computation phase: pivot selection
(Section 5.4), rule detection (Section 2.2), CDD-index and DR-index builds
(Section 5.1). ``warmup`` fills the sliding window (unmeasured, like the
paper's steady-state methodology), and ``run_stream`` drives measured
micro-batches (Section 5.3): expire, impute newly arrived incomplete tuples,
generate and prune candidate pairs, refine survivors exactly, maintain the
entity set ES.

Methods (paper §6.1):
- ``ter``     TER-iDS: indexed imputation + ER-grid with all four prunings,
              refinement with Theorem-4.4 early stopping (the fused pipeline).
- ``ij_ger``  I_j+G_ER: same indexes, but imputation and ER run as separate
              passes and only the grid-native prunes (topic keyword +
              token-size similarity UB) are applied — no shared pivot work,
              no probability/instance-level pruning, full exact refinement.
- ``cdd_er``  CDD rules, no indexes: cross-join imputation + all-pairs exact ER.
- ``dd_er``   DD rules (looser), no indexes.
- ``er_er``   editing rules, no indexes.
- ``con_er``  constraint-based window imputation [43], all-pairs exact ER.

Warmup always retrieves imputation samples through the DR-index regardless of
method — the index probe is *exactly* equivalent to the cross join (asserted
by tests), and warmup is never measured, so this only bounds setup cost.
"""
from __future__ import annotations

import time
from dataclasses import dataclass, field

import pandas as pd
from pyspark.sql import SparkSession

from repro.config import TERConfig
from repro.core.cdd_detect import detect_rules, sample_pair_profile
from repro.core.imputation import (
    ImputeStats,
    impute_batch,
    impute_batch_con,
)
from repro.core.instances import ImputedTuple, aggregates_frame
from repro.core.pivot import select_all_pivots
from repro.core.probability import pr_ter_ids_detail
from repro.index.cdd_index import build_cdd_index
from repro.index.dr_index import build_dr_index
from repro.index.er_grid import (
    PruneStats,
    generate_candidates,
    newnew_candidates,
)
from repro.streams.stream_gen import ATTR_COLS, D, Dataset
from repro.streams.window import WindowBatch, sliding_batches
from repro.ter.baselines import exact_er_spark, instances_frame

METHODS = ["ter", "ij_ger", "cdd_er", "dd_er", "er_er", "con_er"]
_FLAVOR = {"ter": "cdd", "ij_ger": "cdd", "cdd_er": "cdd", "dd_er": "dd", "er_er": "er"}

#: dom_pairs distance cutoff covering every rule flavor's dependent intervals,
#: so one DR-index serves all methods (TAU_DD = 0.70 is the widest).
DOM_PAIRS_CUTOFF = 0.75


def warmup_flavor(method: str) -> str:
    """Methods sharing a rule flavor can share warmup window state."""
    return _FLAVOR.get(method, "con")


@dataclass
class Prepared:
    """Offline pre-computation products for one (dataset, method)."""

    method: str
    pivots: dict
    cddx: object | None
    dr: object | None
    keywords: list[str]
    owns_dr: bool = True

    def unpersist(self) -> None:
        if self.dr is not None and self.owns_dr:
            self.dr.unpersist()
        if self.cddx is not None:
            try:
                self.cddx.rules_df.unpersist()
            except Exception:
                pass


@dataclass
class TERState:
    """Sliding-window state carried between micro-batches."""

    tuples: dict[int, ImputedTuple] = field(default_factory=dict)
    aggs: pd.DataFrame = field(default_factory=pd.DataFrame)
    values: pd.DataFrame = field(default_factory=pd.DataFrame)  # complete rows

    def clone(self) -> "TERState":
        return TERState(dict(self.tuples), self.aggs.copy(), self.values.copy())


@dataclass
class RunResult:
    """Measured outcome of one streaming run."""

    method: str
    pairs: dict = field(default_factory=dict)   # frozenset{rid,rid} -> pr
    prune: PruneStats = field(default_factory=PruneStats)
    t_select: float = 0.0
    t_impute: float = 0.0
    t_er: float = 0.0
    n_arrivals: int = 0

    @property
    def t_total(self) -> float:
        return self.t_select + self.t_impute + self.t_er

    @property
    def per_arrival(self) -> float:
        return self.t_total / max(1, self.n_arrivals)


def select_pivots_for(ds: Dataset, cfg: TERConfig) -> dict:
    domains = {
        k: sorted(ds.repository[c].dropna().unique().tolist())
        for k, c in enumerate(ATTR_COLS)
    }
    return select_all_pivots(
        domains,
        buckets=cfg.pivot_buckets,
        emin=cfg.pivot_emin,
        cnt_max=cfg.pivot_cnt_max,
        seed=cfg.seed,
    )


def prepare(
    spark: SparkSession,
    ds: Dataset,
    cfg: TERConfig,
    method: str,
    *,
    profile: pd.DataFrame | None = None,
    pivots: dict | None = None,
    dr=None,
) -> Prepared:
    """Offline phase. ``profile``/``pivots``/``dr`` may be passed in to share
    the method-independent products across methods (the DR-index is built
    with the flavor-agnostic DOM_PAIRS_CUTOFF, so it serves every flavor)."""
    if pivots is None:
        pivots = select_pivots_for(ds, cfg)
    keywords = ds.keywords[: cfg.n_topic_keywords]
    if method == "con_er":
        return Prepared(method, pivots, None, None, keywords)
    if profile is None:
        profile = sample_pair_profile(spark, ds.repository, seed=cfg.seed)
    rules = detect_rules(spark, ds.repository, flavor=_FLAVOR[method], profile=profile)
    cddx = build_cdd_index(spark, rules)
    owns = dr is None
    if dr is None:
        dr = build_dr_index(
            spark,
            ds.repository,
            pivots,
            n_buckets=cfg.pivot_buckets,
            max_dep_hi=DOM_PAIRS_CUTOFF,
        )
    return Prepared(method, pivots, cddx, dr, keywords, owns_dr=owns)


def _impute(
    spark, method: str, batch: pd.DataFrame, prep: Prepared, cfg: TERConfig,
    state: TERState, *, force_indexed: bool = False,
) -> tuple[list[ImputedTuple], ImputeStats]:
    if method == "con_er":
        return impute_batch_con(
            spark, batch, state.values, prep.pivots, keywords=prep.keywords
        )
    return impute_batch(
        spark, batch, prep.dr, prep.cddx, prep.pivots,
        keywords=prep.keywords,
        indexed=force_indexed or method in ("ter", "ij_ger"),
        max_instances=cfg.max_instances,
    )


def _refine(
    pairs: pd.DataFrame,
    inst_of: dict[int, ImputedTuple],
    *,
    gamma: float,
    alpha: float,
    early: bool,
) -> tuple[dict, int, int]:
    """Exact Eq. (2) on surviving candidate pairs (driver-side kernel).

    Returns (accepted {pair: pr}, n_instance_pruned, n_refined)."""
    accepted: dict = {}
    n_inst = 0
    n_ref = 0
    for row in pairs.itertuples(index=False):
        a = inst_of.get(int(row.rid_n))
        b = inst_of.get(int(row.rid_m))
        if a is None or b is None:
            continue
        pr, stopped = pr_ter_ids_detail(
            a.instances, b.instances, gamma, alpha if early else None
        )
        if pr > alpha:
            accepted[frozenset((a.rid, b.rid))] = pr
            n_ref += 1
        elif stopped:
            n_inst += 1
        else:
            n_ref += 1
    return accepted, n_inst, n_ref


def _expire(state: TERState, expired_rids: list[int]) -> None:
    for rid in expired_rids:
        state.tuples.pop(rid, None)
    if expired_rids and len(state.aggs):
        state.aggs = state.aggs[~state.aggs["rid"].isin(expired_rids)]
    if expired_rids and len(state.values):
        state.values = state.values[~state.values["rid"].isin(expired_rids)]


def _insert(state: TERState, arrived: pd.DataFrame, new_tuples: list[ImputedTuple],
            new_aggs: pd.DataFrame) -> None:
    state.tuples.update({t.rid: t for t in new_tuples})
    state.aggs = (
        pd.concat([state.aggs, new_aggs], ignore_index=True)
        if len(state.aggs)
        else new_aggs
    )
    comp = arrived[~arrived[ATTR_COLS].isna().any(axis=1)]
    state.values = (
        pd.concat([state.values, comp], ignore_index=True)
        if len(state.values)
        else comp
    )


def warmup(
    spark: SparkSession, ds: Dataset, cfg: TERConfig, prep: Prepared
) -> TERState:
    """Process the window-fill batch (step 0) into a reusable TERState.

    Unmeasured; imputation always goes through the DR-index (equivalent
    results, bounded setup cost)."""
    state = TERState()
    for wb in sliding_batches(ds.stream, w=cfg.w, batch_size=cfg.batch_size,
                              max_batches=0):
        assert wb.step == 0
        new_tuples, _ = _impute(
            spark, prep.method, wb.arrived, prep, cfg, state, force_indexed=True
        )
        _insert(state, wb.arrived, new_tuples, aggregates_frame(new_tuples))
    return state


def run_stream(
    spark: SparkSession,
    ds: Dataset,
    cfg: TERConfig,
    prep: Prepared,
    *,
    max_batches: int = 3,
    warm: TERState | None = None,
) -> RunResult:
    """Drive measured micro-batches over the sliding window.

    ``warm``: a warmup state snapshot (from :func:`warmup`) to resume from —
    it is cloned, never mutated, so one snapshot serves a whole sweep."""
    method = prep.method
    res = RunResult(method=method)
    state = warm.clone() if warm is not None else None

    for wb in sliding_batches(
        ds.stream, w=cfg.w, batch_size=cfg.batch_size, max_batches=max_batches
    ):
        if wb.step == 0:
            if state is None:
                state = TERState()
                new_tuples, _ = _impute(
                    spark, method, wb.arrived, prep, cfg, state, force_indexed=True
                )
                _insert(state, wb.arrived, new_tuples, aggregates_frame(new_tuples))
            continue
        _run_measured_batch(spark, ds, cfg, prep, wb, state, res)
    return res


def _run_measured_batch(
    spark, ds: Dataset, cfg: TERConfig, prep: Prepared, wb: WindowBatch,
    state: TERState, res: RunResult,
) -> None:
    method = prep.method
    _expire(state, wb.expired_rids)

    new_tuples, istats = _impute(spark, method, wb.arrived, prep, cfg, state)
    res.t_select += istats.t_select
    res.t_impute += istats.t_impute
    res.n_arrivals += wb.n_arrivals
    new_map = {t.rid: t for t in new_tuples}
    new_aggs = aggregates_frame(new_tuples)

    t0 = time.perf_counter()
    if method in ("ter", "ij_ger"):
        fused = method == "ter"
        if len(state.aggs):
            cand, st1 = generate_candidates(
                spark, new_aggs, state.aggs,
                d=cfg.d, gamma=cfg.gamma, alpha=cfg.alpha,
                cells_per_dim=cfg.grid_cells_per_dim,
                use_pivot=fused, use_prob=fused,
            )
        else:
            cand, st1 = pd.DataFrame(columns=["rid_n", "rid_m"]), PruneStats()
        cand2, st2 = newnew_candidates(
            new_aggs, d=cfg.d, gamma=cfg.gamma, alpha=cfg.alpha,
            use_pivot=fused, use_prob=fused,
        )
        res.prune.add(st1)
        res.prune.add(st2)
        allcand = pd.concat([cand, cand2], ignore_index=True)
        inst_of = {**state.tuples, **new_map}
        acc, n_inst, n_ref = _refine(
            allcand, inst_of, gamma=cfg.gamma, alpha=cfg.alpha, early=fused
        )
        res.prune.pruned_instance += n_inst
        res.prune.refined += n_ref
        res.pairs.update(acc)
    else:
        new_inst = instances_frame(new_tuples)
        pool_inst = pd.concat(
            [instances_frame(list(state.tuples.values())), new_inst],
            ignore_index=True,
        )
        got = exact_er_spark(
            spark, new_inst, pool_inst, gamma=cfg.gamma, alpha=cfg.alpha
        )
        for row in got.itertuples(index=False):
            res.pairs[frozenset((int(row.rid_n), int(row.rid_m)))] = row.pr
        # Work accounting: the straightforward ER evaluates every
        # cross-stream pair exactly (no pruning) — the substrate-independent
        # cost the paper's index join removes.
        n_new = {0: 0, 1: 0}
        for t in new_tuples:
            n_new[t.stream_id] = n_new.get(t.stream_id, 0) + 1
        n_win = {0: 0, 1: 0}
        for t in state.tuples.values():
            n_win[t.stream_id] = n_win.get(t.stream_id, 0) + 1
        total = (
            n_new[0] * n_win[1] + n_new[1] * n_win[0] + n_new[0] * n_new[1]
        )
        res.prune.total += total
        res.prune.refined += total
    res.t_er += time.perf_counter() - t0

    _insert(state, wb.arrived, new_tuples, new_aggs)
