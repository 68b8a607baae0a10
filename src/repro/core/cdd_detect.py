"""CDD / DD / editing-rule detection from the repository R (paper §2.2).

Following the literature the paper cites ([19, 41, 35, 12]), rules of the
form ``A_x -> A_j`` are fit from pairwise distance profiles of repository
samples:

1. **Pair sampling (Spark)**: repository tuples are tokenized and self-joined
   inside random blocks (a sampled subset of the quadratic pair space); for
   every sampled pair, per-attribute Jaccard distances are computed with
   Catalyst array expressions and collected (the profile is small).
2. **DD fitting (numpy)**: for each (determinant x, dependent j), the largest
   determinant radius ``eps`` on a grid such that the conditional dependent
   distance stays within an acceptable interval (95th percentile <= tau)
   yields a DD ``A_x -> A_j, {[0, eps], [0, ub]}``.
3. **CDD refinement**: the determinant range is split into bands with
   ``eps.min > 0`` (the paper's relaxation) and per-band two-sided dependent
   intervals — tighter rules than the parent DD.
4. **Editing-rule fallback** (paper: "if any determinant attributes cannot
   accurately impute A_j ... adopt editing rule"): exact-match constraint,
   encoded as the degenerate interval [0, 0] (token-set equality).
5. **Lattice level 2**: the two best single-determinant rules per dependent
   are conjoined via :func:`repro.core.cdd.combine_rules`.

``detect_rules(..., flavor=...)`` returns the rule set for TER-iDS/CDD
("cdd"), the looser-interval DD baseline ("dd"), or editing rules only
("er").
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.core.cdd import CDDRule, Constraint, combine_rules
from repro.core.similarity import jaccard_dist_col, tokens_col
from repro.streams.stream_gen import ATTR_COLS, D

#: acceptable dependent-interval width (paper: "acceptable interval")
TAU_CDD = 0.50
TAU_DD = 0.70
#: separation point between the "dependent follows determinant" low mode and
#: coincidental cross-entity contamination in conditional distance profiles
_TAU_SEP = 0.6
#: minimum confidence: fraction of conditional mass in the low mode
_MIN_CONF = 0.75
_EPS_GRID = np.arange(0.15, 0.85, 0.05)


def sample_pair_profile(
    spark: SparkSession, repo: pd.DataFrame, *, n_blocks: int | None = None,
    seed: int = 0,
) -> pd.DataFrame:
    """Spark: sampled pairwise per-attribute Jaccard distances from R.

    Two pair strata are unioned, as in similarity-join-based rule discovery:
    *random blocks* (block size ~16; background distance distribution) and
    *locality blocks* (consecutive sids; repositories list near-duplicate
    records nearby, so these blocks surface the similar pairs that carry the
    dependency signal). Pair count is bounded at roughly ``|R| * 12``.
    """
    if n_blocks is None:
        n_blocks = max(1, len(repo) // 16)
    sdf = spark.createDataFrame(repo[["sid"] + ATTR_COLS])
    tok = sdf.select(
        "sid",
        F.pmod(F.hash(F.col("sid") + F.lit(seed)), F.lit(n_blocks)).alias("blk"),
        (F.col("sid") / 8).cast("int").alias("lblk"),
        *[tokens_col(F.col(c)).alias(f"t{k}") for k, c in enumerate(ATTR_COLS)],
    )
    left = tok.alias("l")
    right = tok.alias("r")
    same_rand = F.col("l.blk") == F.col("r.blk")
    same_local = F.col("l.lblk") == F.col("r.lblk")
    pairs = left.join(
        F.broadcast(right),
        (same_rand | same_local) & (F.col("l.sid") < F.col("r.sid")),
    )
    prof = pairs.select(
        *[
            jaccard_dist_col(F.col(f"l.t{k}"), F.col(f"r.t{k}")).alias(f"d{k}")
            for k in range(D)
        ]
    )
    return prof.toPandas()


def _fit_single(
    profile: pd.DataFrame, x: int, j: int, *, tau: float, bands: bool
) -> list[CDDRule]:
    """Fit interval rules ``A_x -> A_j`` from the pair profile."""
    dx = profile[f"d{x}"].to_numpy()
    dj = profile[f"d{j}"].to_numpy()

    def fit_ub(sel: np.ndarray) -> float | None:
        """Dependent-interval upper bound of the dominant low mode, or None
        if the conditional profile lacks support, confidence, or tightness
        (support/confidence-style discovery, cf. DD discovery [35])."""
        if len(sel) < 10:
            return None
        low = sel[sel <= _TAU_SEP]
        if len(low) / len(sel) < _MIN_CONF:
            return None
        ub = float(np.quantile(low, 0.90))
        return ub if ub <= tau else None

    best_eps, ub = None, None
    for eps in _EPS_GRID[::-1]:          # largest radius first
        got = fit_ub(dj[dx <= eps])
        if got is not None:
            best_eps, ub = float(eps), got
            break
    if best_eps is None:
        return []
    rules: list[CDDRule] = []
    # The parent DD: [0, eps] -> [0, ub].
    rules.append(
        CDDRule(j, (Constraint(x, interval=(0.0, best_eps)),), (0.0, max(ub, 1e-6)))
    )
    if bands and best_eps > 0.2:
        # CDD refinement: two bands with eps.min > 0 and two-sided dependent
        # intervals (tighter than the DD on each band).
        mid = best_eps / 2
        for lo, hi in ((0.0, mid), (mid, best_eps)):
            band = dj[(dx >= lo) & (dx <= hi)]
            band = band[band <= _TAU_SEP]       # fit the dominant low mode
            if len(band) < 10:
                continue
            dep_lo = float(np.quantile(band, 0.02))
            dep_hi = float(np.quantile(band, 0.90))
            if dep_hi - dep_lo >= ub:
                continue                  # not tighter than the parent
            rules.append(
                CDDRule(
                    j,
                    (Constraint(x, interval=(lo, hi) if lo > 0 else (0.0, hi)),),
                    (dep_lo, max(dep_hi, dep_lo + 1e-6)),
                )
            )
    return rules


def _editing_rules(profile: pd.DataFrame, j: int, *, tau: float = TAU_CDD) -> list[CDDRule]:
    """Editing-rule fallback [12]: exact determinant equality (the degenerate
    interval [0,0]) with a tight dependent interval — editing rules produce
    "certain fixes", i.e. fill with (values equal or near-equal to) the
    matching sample's dependent value."""
    rules = []
    for x in range(D):
        if x == j:
            continue
        dx = profile[f"d{x}"].to_numpy()
        dj = profile[f"d{j}"].to_numpy()
        sel = dj[dx == 0.0]
        ub = float(np.quantile(sel, 0.5)) if len(sel) >= 5 else 0.0
        rules.append(
            CDDRule(j, (Constraint(x, interval=(0.0, 0.0)),), (0.0, min(ub, tau)))
        )
    return rules


def detect_rules(
    spark: SparkSession,
    repo: pd.DataFrame,
    *,
    flavor: str = "cdd",
    tau: float | None = None,
    seed: int = 0,
    profile: pd.DataFrame | None = None,
) -> dict[int, list[CDDRule]]:
    """Detect imputation rules for every dependent attribute.

    Returns ``{dependent_attr: [rules]}``. ``flavor``:
    - ``"cdd"``: banded CDDs + editing fallback + level-2 lattice rules;
    - ``"dd"``:  plain DDs with looser tau (the DD+ER baseline);
    - ``"er"``:  editing rules only (the er+ER baseline).
    """
    if profile is None:
        profile = sample_pair_profile(spark, repo, seed=seed)
    out: dict[int, list[CDDRule]] = {}
    for j in range(D):
        rules: list[CDDRule] = []
        if flavor == "er":
            rules = _editing_rules(profile, j)
        else:
            t = tau if tau is not None else (TAU_DD if flavor == "dd" else TAU_CDD)
            for x in range(D):
                if x == j:
                    continue
                rules.extend(
                    _fit_single(profile, x, j, tau=t, bands=(flavor == "cdd"))
                )
            if flavor == "cdd":
                if not rules:
                    rules = _editing_rules(profile, j)
                else:
                    # Level-2 lattice: conjoin the two tightest level-1 rules
                    # on distinct determinants.
                    lvl1 = sorted(
                        (r for r in rules if r.level == 1),
                        key=lambda r: r.dep_interval[1] - r.dep_interval[0],
                    )
                    seen: dict[int, CDDRule] = {}
                    for r in lvl1:
                        seen.setdefault(r.determinants[0], r)
                        if len(seen) == 2:
                            break
                    if len(seen) == 2:
                        a, b = seen.values()
                        try:
                            rules.append(combine_rules(a, b))
                        except ValueError:
                            pass
        out[j] = rules
    return out
