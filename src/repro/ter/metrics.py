"""Evaluation measures (paper §6.1): F-score (Eq. 6) and pruning power."""
from __future__ import annotations

from dataclasses import dataclass

from repro.index.er_grid import PruneStats


@dataclass(frozen=True)
class FScore:
    precision: float
    recall: float
    f: float
    n_returned: int
    n_truth: int


def f_score(returned: set[frozenset], truth: set[frozenset]) -> FScore:
    """Eq. (6): harmonic mean of precision and recall of returned pairs."""
    tp = len(returned & truth)
    precision = tp / len(returned) if returned else 0.0
    recall = tp / len(truth) if truth else 0.0
    f = (
        2 * precision * recall / (precision + recall)
        if precision + recall > 0
        else 0.0
    )
    return FScore(precision, recall, f, len(returned), len(truth))


def pruning_power(stats: PruneStats) -> dict[str, float]:
    """Fractions of total candidate pairs pruned per strategy (Fig. 4)."""
    tot = max(1, stats.total)
    out = {
        "topic": stats.pruned_topic / tot,
        "sim_ub": stats.pruned_sim / tot,
        "prob_ub": stats.pruned_prob / tot,
        "instance": stats.pruned_instance / tot,
    }
    out["total"] = sum(out.values())
    return out
