"""Cost-model-based pivot selection — paper Section 5.4 + Appendix B.

For each attribute ``A_x`` we pick ``n_x`` pivot *attribute values* from
``dom(A_x)`` in the repository R. The converting quality of a pivot is the
Shannon entropy (Eq. 5) of the histogram of converted values
``dist(s[A_x], piv[A_x])`` over P equal-width buckets of [0, 1]: larger
entropy = more even spread = better pruning power of the pivot-converted
space. Appendix B: pick the max-entropy main pivot; add auxiliary pivots
(greedy, by marginal entropy of their own histogram) until the achieved
entropy reaches ``eMin`` or ``cntMax`` pivots are selected.

This is an offline pre-computation over the (small) repository, run
driver-side with numpy; the selected pivots parameterize every index
(CDD-index, DR-index, ER-grid) built afterwards.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np

from repro.core.similarity import jaccard_dist, tokens


def shannon_entropy(converted: np.ndarray, buckets: int = 10) -> float:
    """Eq. (5): entropy of the bucket histogram of converted values in [0,1]."""
    if len(converted) == 0:
        return 0.0
    hist, _ = np.histogram(np.clip(converted, 0.0, 1.0), bins=buckets, range=(0.0, 1.0))
    pdf = hist / hist.sum()
    nz = pdf[pdf > 0]
    return float(-(nz * np.log(nz)).sum())


def _dists_to(pivot_tokens: frozenset, domain_tokens: list[frozenset]) -> np.ndarray:
    return np.fromiter(
        (jaccard_dist(pivot_tokens, t) for t in domain_tokens),
        dtype=float,
        count=len(domain_tokens),
    )


@dataclass(frozen=True)
class AttributePivots:
    """Selected pivots for one attribute: ``values[0]`` is the main pivot
    piv_1[A_x]; the rest are auxiliary pivots. ``entropy`` is the entropy of
    the main pivot's converted distribution (Eq. 5)."""

    attr: int
    values: tuple[str, ...]
    entropy: float

    @property
    def main(self) -> str:
        return self.values[0]

    @property
    def main_tokens(self) -> frozenset:
        return tokens(self.values[0])

    @property
    def aux_tokens(self) -> tuple[frozenset, ...]:
        return tuple(tokens(v) for v in self.values[1:])


def select_pivots(
    domain: list[str],
    *,
    attr: int,
    buckets: int = 10,
    emin: float = 1.5,
    cnt_max: int = 3,
    n_candidates: int = 32,
    seed: int = 0,
) -> AttributePivots:
    """Select up to ``cnt_max`` pivots for one attribute from its domain.

    Candidates are a deterministic sample of the domain (the full domain for
    small domains). The main pivot maximizes Eq. (5); auxiliary pivots are
    added greedily by their own entropy until the max per-pivot entropy seen
    reaches ``emin`` or ``cnt_max`` is hit (Appendix B).
    """
    if not domain:
        raise ValueError("empty attribute domain")
    rng = np.random.default_rng(seed)
    if len(domain) > n_candidates:
        idx = rng.choice(len(domain), size=n_candidates, replace=False)
        candidates = [domain[i] for i in sorted(idx)]
    else:
        candidates = list(domain)
    dom_tokens = [tokens(v) for v in domain]

    scored = sorted(
        ((shannon_entropy(_dists_to(tokens(c), dom_tokens), buckets), c) for c in candidates),
        key=lambda t: (-t[0], t[1]),
    )
    chosen = [scored[0]]
    for ent, cand in scored[1:]:
        if chosen[0][0] >= emin or len(chosen) >= cnt_max:
            break
        if cand not in {c for _, c in chosen}:
            chosen.append((ent, cand))
    return AttributePivots(
        attr=attr,
        values=tuple(c for _, c in chosen),
        entropy=chosen[0][0],
    )


def select_all_pivots(
    domains: dict[int, list[str]],
    *,
    buckets: int = 10,
    emin: float = 1.5,
    cnt_max: int = 3,
    seed: int = 0,
) -> dict[int, AttributePivots]:
    """Select pivots for every attribute (key = attribute index)."""
    return {
        a: select_pivots(
            dom, attr=a, buckets=buckets, emin=emin, cnt_max=cnt_max, seed=seed + a
        )
        for a, dom in domains.items()
    }
