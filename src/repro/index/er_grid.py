"""ER-grid synopsis over sliding windows (paper §5.2) + candidate generation.

The grid assigns every (imputed) window tuple to a d-dimensional cell by its
per-attribute main-pivot distance lower bound. Cells carry the paper's
aggregates: keyword existence, minimally-bounding pivot-distance intervals,
token-set-size intervals, and per-stream member counts. Candidate generation
for a micro-batch is a Spark pipeline:

  new-tuples x cells  -> cell-level pruning (Thm 4.1 / Thm 4.2 via
                          Lemmas 4.1-4.2 on cell aggregates)
  survivors x members -> tuple-level pruning (Thm 4.1, Lemmas 4.1-4.2,
                          Thm 4.3 via the Lemma-4.3 Paley-Zygmund column)

A cell pruned at stage s attributes all its eligible member pairs to stage s
(index-level pruning credited to its theorem, as in the paper's Figure 4).
New-vs-new pairs (both sides arriving in the same batch) are checked in a
vectorized driver pass using the same numpy kernels, with identical stage
accounting.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np
import pandas as pd
from pyspark.sql import Column, Observation, SparkSession
from pyspark.sql import functions as F

from repro.core import pruning as PR
from repro.streams.stream_gen import D

AGG_COLS = [f"{p}{k}" for k in range(D) for p in ("lb", "ub", "e", "tmin", "tmax")]


@dataclass
class PruneStats:
    """Stage-attributed pair accounting (Fig. 4 pruning power)."""

    total: int = 0
    pruned_topic: int = 0
    pruned_sim: int = 0
    pruned_prob: int = 0
    pruned_instance: int = 0   # filled by the refinement (Thm 4.4)
    refined: int = 0           # pairs that reached exact evaluation

    def add(self, other: "PruneStats") -> None:
        for f in ("total", "pruned_topic", "pruned_sim", "pruned_prob",
                  "pruned_instance", "refined"):
            setattr(self, f, getattr(self, f) + getattr(other, f))

    @property
    def survivors(self) -> int:
        return self.total - self.pruned_topic - self.pruned_sim - self.pruned_prob


def assign_cells(aggs: pd.DataFrame, cells_per_dim: int) -> pd.Series:
    """Cell id string from quantized per-attribute lb distances."""
    parts = []
    for k in range(D):
        b = np.clip(
            (aggs[f"lb{k}"].to_numpy() * cells_per_dim).astype(int),
            0,
            cells_per_dim - 1,
        )
        parts.append(b.astype(str))
    out = parts[0]
    for p in parts[1:]:
        out = np.char.add(np.char.add(out, "|"), p)
    return pd.Series(out, index=aggs.index)


def build_cells(members: pd.DataFrame) -> pd.DataFrame:
    """Cell aggregate table from a member frame that has ``cell`` assigned."""
    agg_spec = {"kw_any": ("kw_mask", lambda s: int((s != 0).any()))}
    for k in range(D):
        agg_spec[f"clb{k}"] = (f"lb{k}", "min")
        agg_spec[f"cub{k}"] = (f"ub{k}", "max")
        agg_spec[f"ctmin{k}"] = (f"tmin{k}", "min")
        agg_spec[f"ctmax{k}"] = (f"tmax{k}", "max")
    cells = members.groupby("cell").agg(**agg_spec).reset_index()
    counts = (
        members.groupby(["cell", "stream_id"]).size().unstack(fill_value=0)
    )
    for s in (0, 1):
        cells[f"n{s}"] = counts.get(s, pd.Series(0, index=counts.index)).reindex(
            cells["cell"]
        ).fillna(0).to_numpy(dtype=int)
    return cells


def _ts_ub_col(tmin_i, tmax_i, tmin_j, tmax_j) -> Column:
    """Lemma 4.1 per-attribute similarity upper bound as a Spark column.

    ``try_divide`` (not ``/``): under ANSI mode, codegen subexpression
    elimination may evaluate a guarded division even when its ``when`` branch
    is not taken, turning a well-guarded 0-denominator into a hard error.
    """
    ub = (
        F.when((tmax_i == 0) | (tmax_j == 0), F.lit(0.0))
        .when(tmin_i > tmax_j, F.try_divide(tmax_j, tmin_i))
        .when(tmax_i < tmin_j, F.try_divide(tmax_i, tmin_j))
        .otherwise(F.lit(1.0))
    )
    return ub


def _min_dist_col(lb_x, ub_x, lb_y, ub_y) -> Column:
    """Lemma 4.2 per-attribute minimum-distance as a Spark column."""
    return (
        F.when(lb_x > ub_y, lb_x - ub_y)
        .when(lb_y > ub_x, lb_y - ub_x)
        .otherwise(F.lit(0.0))
    )


def paley_zygmund_col(
    d: int, gamma: float, e_x, e_y, lb_x, ub_x, lb_y, ub_y
) -> Column:
    """Lemma 4.3 probability upper bound as a Spark column (see
    :func:`repro.core.pruning.ub_prob_paley_zygmund` for the numpy twin)."""
    t = F.lit(float(d) - float(gamma))
    # try_divide everywhere: ANSI mode would otherwise raise on the zero
    # denominators of rows that never take the guarded branch.
    th1 = F.try_divide(t, e_x - e_y)
    b1 = F.lit(1.0) - (F.lit(1.0) - th1) * (F.lit(1.0) - th1) * F.try_divide(
        e_x - e_y, ub_x - lb_y
    )
    c1 = (lb_x >= ub_y) & (th1 >= 0) & (th1 <= 1) & ((ub_x - lb_y) > 0)
    th2 = F.try_divide(t, e_y - e_x)
    b2 = F.lit(1.0) - (F.lit(1.0) - th2) * (F.lit(1.0) - th2) * F.try_divide(
        e_y - e_x, ub_y - lb_x
    )
    c2 = (lb_y >= ub_x) & (th2 >= 0) & (th2 <= 1) & ((ub_y - lb_x) > 0)
    raw = F.when(c1, b1).when(c2, b2).otherwise(F.lit(1.0))
    return F.greatest(F.lit(0.0), F.least(F.lit(1.0), raw))


def generate_candidates(
    spark: SparkSession,
    new_aggs: pd.DataFrame,
    window_aggs: pd.DataFrame,
    *,
    d: int,
    gamma: float,
    alpha: float,
    cells_per_dim: int,
    use_pivot: bool = True,
    use_prob: bool = True,
) -> tuple[pd.DataFrame, PruneStats]:
    """Grid-based candidate pairs (new x window) with staged pruning.

    Returns (pairs frame with columns rid_n/rid_m, stats). ``use_pivot`` /
    ``use_prob`` gate the Lemma-4.2/4.3 stages (the I_j+G_ER baseline runs
    without the fused pivot-sharing prunes, DESIGN.md §2.4).
    """
    stats = PruneStats()
    if new_aggs.empty or window_aggs.empty:
        return pd.DataFrame(columns=["rid_n", "rid_m"]), stats

    members = window_aggs.copy()
    members["cell"] = assign_cells(members, cells_per_dim)
    cells = build_cells(members)

    nsdf = spark.createDataFrame(
        new_aggs.rename(columns={c: f"n_{c}" for c in new_aggs.columns})
    )
    csdf = spark.createDataFrame(cells)
    joined = nsdf.crossJoin(F.broadcast(csdf))

    elig = F.when(F.col("n_stream_id") == 0, F.col("n1")).otherwise(F.col("n0"))
    kw_ok = (F.col("n_kw_mask") != 0) | (F.col("kw_any") != 0)
    ts_ub = sum(
        _ts_ub_col(
            F.col(f"n_tmin{k}"), F.col(f"n_tmax{k}"),
            F.col(f"ctmin{k}"), F.col(f"ctmax{k}"),
        )
        for k in range(D)
    )
    piv_ub = F.lit(float(d)) - sum(
        _min_dist_col(
            F.col(f"n_lb{k}"), F.col(f"n_ub{k}"),
            F.col(f"clb{k}"), F.col(f"cub{k}"),
        )
        for k in range(D)
    )
    sim_ok = ts_ub > gamma
    if use_pivot:
        sim_ok = sim_ok & (piv_ub > gamma)
    joined = joined.withColumn("elig", elig).withColumn("kw_ok", kw_ok).withColumn(
        "sim_ok", sim_ok
    )

    # Stage counters ride along as Observation metrics — the whole candidate
    # pipeline (cell prune -> member expand -> tuple prune) runs as a single
    # Spark action, so the fused TER path is not taxed with extra job
    # round-trips just for Fig.-4 accounting.
    cell_obs = Observation("cells")
    joined = joined.observe(
        cell_obs,
        F.sum("elig").alias("total"),
        F.sum(F.when(~F.col("kw_ok"), F.col("elig")).otherwise(0)).alias("p_kw"),
        F.sum(
            F.when(F.col("kw_ok") & ~F.col("sim_ok"), F.col("elig")).otherwise(0)
        ).alias("p_sim"),
    )

    surv_cells = joined.where(F.col("kw_ok") & F.col("sim_ok")).select(
        *[F.col(c) for c in nsdf.columns], "cell"
    )
    msdf = spark.createDataFrame(
        members.rename(columns={c: f"m_{c}" for c in members.columns if c != "cell"})
    )
    pairs = surv_cells.join(F.broadcast(msdf), "cell").where(
        F.col("m_stream_id") != F.col("n_stream_id")
    )

    t_kw = (F.col("n_kw_mask") != 0) | (F.col("m_kw_mask") != 0)
    t_ts = sum(
        _ts_ub_col(
            F.col(f"n_tmin{k}"), F.col(f"n_tmax{k}"),
            F.col(f"m_tmin{k}"), F.col(f"m_tmax{k}"),
        )
        for k in range(D)
    ) > gamma
    t_piv = (
        F.lit(float(d))
        - sum(
            _min_dist_col(
                F.col(f"n_lb{k}"), F.col(f"n_ub{k}"),
                F.col(f"m_lb{k}"), F.col(f"m_ub{k}"),
            )
            for k in range(D)
        )
    ) > gamma
    t_sim = t_ts & t_piv if use_pivot else t_ts
    if use_prob:
        prob_ub = paley_zygmund_col(
            d, gamma,
            sum(F.col(f"n_e{k}") for k in range(D)),
            sum(F.col(f"m_e{k}") for k in range(D)),
            sum(F.col(f"n_lb{k}") for k in range(D)),
            sum(F.col(f"n_ub{k}") for k in range(D)),
            sum(F.col(f"m_lb{k}") for k in range(D)),
            sum(F.col(f"m_ub{k}") for k in range(D)),
        )
        t_prob = prob_ub > alpha
    else:
        t_prob = F.lit(True)
    pairs = pairs.withColumn("t_kw", t_kw).withColumn("t_sim", t_sim).withColumn(
        "t_prob", t_prob
    )
    tup_obs = Observation("tuples")
    pairs = pairs.observe(
        tup_obs,
        F.sum(F.when(~F.col("t_kw"), 1).otherwise(0)).alias("p_kw"),
        F.sum(F.when(F.col("t_kw") & ~F.col("t_sim"), 1).otherwise(0)).alias("p_sim"),
        F.sum(
            F.when(F.col("t_kw") & F.col("t_sim") & ~F.col("t_prob"), 1).otherwise(0)
        ).alias("p_prob"),
    )

    out = (
        pairs.where(F.col("t_kw") & F.col("t_sim") & F.col("t_prob"))
        .select(F.col("n_rid").alias("rid_n"), F.col("m_rid").alias("rid_m"))
        .toPandas()
    )
    cm = cell_obs.get
    tm = tup_obs.get
    stats.total += int(cm["total"] or 0)
    stats.pruned_topic += int(cm["p_kw"] or 0) + int(tm["p_kw"] or 0)
    stats.pruned_sim += int(cm["p_sim"] or 0) + int(tm["p_sim"] or 0)
    stats.pruned_prob += int(tm["p_prob"] or 0)
    return out, stats


def newnew_candidates(
    new_aggs: pd.DataFrame,
    *,
    d: int,
    gamma: float,
    alpha: float,
    use_pivot: bool = True,
    use_prob: bool = True,
) -> tuple[pd.DataFrame, PruneStats]:
    """Same-batch (new x new) cross-stream pairs via the numpy kernels —
    identical pruning order and stage accounting as the Spark path."""
    stats = PruneStats()
    a = new_aggs.reset_index(drop=True)
    if len(a) < 2:
        return pd.DataFrame(columns=["rid_n", "rid_m"]), stats
    idx_i, idx_j = np.triu_indices(len(a), k=1)
    cross = a["stream_id"].to_numpy()[idx_i] != a["stream_id"].to_numpy()[idx_j]
    idx_i, idx_j = idx_i[cross], idx_j[cross]
    stats.total = len(idx_i)
    if stats.total == 0:
        return pd.DataFrame(columns=["rid_n", "rid_m"]), stats

    def col(name, idx):
        return a[name].to_numpy()[idx]

    kw_pruned = PR.topic_keyword_prune(
        col("kw_mask", idx_i) != 0, col("kw_mask", idx_j) != 0
    )
    ts_ub = sum(
        PR.ub_sim_token_size(
            col(f"tmin{k}", idx_i), col(f"tmax{k}", idx_i),
            col(f"tmin{k}", idx_j), col(f"tmax{k}", idx_j),
        )
        for k in range(D)
    )
    piv_ub = float(d) - sum(
        PR.ub_sim_pivot(
            col(f"lb{k}", idx_i), col(f"ub{k}", idx_i),
            col(f"lb{k}", idx_j), col(f"ub{k}", idx_j),
        )
        for k in range(D)
    )
    sim_ok = ts_ub > gamma
    if use_pivot:
        sim_ok &= piv_ub > gamma
    if use_prob:
        prob_ub = PR.ub_prob_paley_zygmund(
            d, gamma,
            sum(col(f"e{k}", idx_i) for k in range(D)),
            sum(col(f"e{k}", idx_j) for k in range(D)),
            sum(col(f"lb{k}", idx_i) for k in range(D)),
            sum(col(f"ub{k}", idx_i) for k in range(D)),
            sum(col(f"lb{k}", idx_j) for k in range(D)),
            sum(col(f"ub{k}", idx_j) for k in range(D)),
        )
        prob_ok = prob_ub > alpha
    else:
        prob_ok = np.ones(len(idx_i), dtype=bool)

    surv = ~kw_pruned
    stats.pruned_topic = int(kw_pruned.sum())
    stats.pruned_sim = int((surv & ~sim_ok).sum())
    surv &= sim_ok
    stats.pruned_prob = int((surv & ~prob_ok).sum())
    surv &= prob_ok
    out = pd.DataFrame(
        {
            "rid_n": a["rid"].to_numpy()[idx_j[surv]],
            "rid_m": a["rid"].to_numpy()[idx_i[surv]],
        }
    )
    return out, stats
