"""Exact TER-iDS probability (paper Eq. 2) with Theorem-4.4 early stopping.

The refinement phase evaluates, for a candidate tuple pair, the probability
mass of instance pairs that contain a topic keyword and exceed the similarity
threshold. Instances are (value-tuple, probability) pairs produced by the
imputation phase (complete tuples have a single instance with p = 1).
"""
from __future__ import annotations

from typing import Sequence

from repro.core.similarity import jaccard, tokens


class Instance:
    """One probabilistic instance of an imputed tuple (Def. 4).

    ``attrs``: d attribute values (token strings); ``p``: existence
    probability; ``token_sets``/``has_kw`` are cached derived state used by
    the refinement kernel.
    """

    __slots__ = ("attrs", "p", "token_sets", "has_kw")

    def __init__(self, attrs: Sequence[str | None], p: float, keywords=frozenset()):
        self.attrs = tuple(attrs)
        self.p = float(p)
        self.token_sets = tuple(tokens(a) for a in self.attrs)
        all_tokens = set().union(*self.token_sets) if self.token_sets else set()
        self.has_kw = bool(all_tokens & set(keywords))


def sim_instances(a: Instance, b: Instance) -> float:
    """Eq. (1) over two cached-token instances."""
    return sum(jaccard(x, y) for x, y in zip(a.token_sets, b.token_sets))


def pr_ter_ids(
    inst_i: Sequence[Instance],
    inst_j: Sequence[Instance],
    gamma: float,
    alpha: float | None = None,
) -> float:
    """Eq. (2): ``sum_{m,m'} p_m p_m' chi((kw_i or kw_j) and sim > gamma)``.

    When ``alpha`` is given, applies Theorem 4.4 in both directions to stop
    early: if even counting all *unchecked* mass as matching the total cannot
    exceed ``alpha`` the pair is doomed (return current lower bound, which is
    ``<= alpha``); if the already-accumulated matching mass exceeds ``alpha``
    the pair is accepted (return the accumulated lower bound, ``> alpha``).
    The returned value is then only guaranteed to be on the correct side of
    ``alpha``, which is all the caller thresholds on.
    """
    return pr_ter_ids_detail(inst_i, inst_j, gamma, alpha)[0]


def pr_ter_ids_detail(
    inst_i: Sequence[Instance],
    inst_j: Sequence[Instance],
    gamma: float,
    alpha: float | None = None,
) -> tuple[float, bool]:
    """Like :func:`pr_ter_ids`, also reporting whether Theorem 4.4 stopped the
    evaluation early with a *rejection* (the paper's fourth pruning stage —
    "instance-pair-level pruning" counts exactly these)."""
    acc = 0.0            # sum of matching mass over checked pairs
    checked = 0.0        # sum of p_i * p_j over checked pairs
    n = len(inst_i) * len(inst_j)
    done = 0
    for a in inst_i:
        for b in inst_j:
            mass = a.p * b.p
            if mass > 0 and (a.has_kw or b.has_kw) and sim_instances(a, b) > gamma:
                acc += mass
            checked += mass
            done += 1
            if alpha is not None:
                if acc > alpha:           # already decided: match
                    return acc, False
                if acc + (1.0 - checked) <= alpha:   # Thm 4.4: doomed
                    return acc, done < n
    return acc, False
