"""Pivot selection tests (Eq. 5 entropy + Appendix-B cost model)."""
import numpy as np
import pytest

from repro.core.pivot import (
    AttributePivots,
    select_all_pivots,
    select_pivots,
    shannon_entropy,
)


class TestShannonEntropy:
    def test_uniform_is_max(self):
        conv = np.linspace(0.001, 0.999, 1000)
        assert shannon_entropy(conv, buckets=10) == pytest.approx(np.log(10), rel=1e-3)

    def test_degenerate_is_zero(self):
        assert shannon_entropy(np.full(100, 0.5)) == 0.0

    def test_empty(self):
        assert shannon_entropy(np.array([])) == 0.0

    def test_more_even_means_larger(self):
        even = np.linspace(0, 1, 200)
        skew = np.concatenate([np.full(180, 0.1), np.linspace(0, 1, 20)])
        assert shannon_entropy(even) > shannon_entropy(skew)


class TestSelectPivots:
    DOMAIN = [f"tok{i} tok{i+1} tok{i+2}" for i in range(40)] + ["x y z", "p q"]

    def test_main_pivot_maximizes_entropy(self):
        got = select_pivots(self.DOMAIN, attr=0, emin=0.0, cnt_max=3, seed=1)
        # emin=0 -> single pivot, and it must be the entropy argmax among
        # sampled candidates.
        assert len(got.values) == 1
        from repro.core.similarity import jaccard_dist, tokens
        from repro.core.pivot import _dists_to

        dom_tokens = [tokens(v) for v in self.DOMAIN]
        ent = shannon_entropy(_dists_to(tokens(got.main), dom_tokens))
        assert ent == pytest.approx(got.entropy)

    def test_emin_triggers_auxiliary_pivots(self):
        got = select_pivots(self.DOMAIN, attr=0, emin=99.0, cnt_max=3, seed=1)
        assert len(got.values) == 3     # entropy can never reach 99

    def test_cnt_max_respected(self):
        got = select_pivots(self.DOMAIN, attr=0, emin=99.0, cnt_max=2, seed=1)
        assert len(got.values) == 2

    def test_deterministic(self):
        a = select_pivots(self.DOMAIN, attr=0, seed=5)
        b = select_pivots(self.DOMAIN, attr=0, seed=5)
        assert a == b

    def test_empty_domain_raises(self):
        with pytest.raises(ValueError):
            select_pivots([], attr=0)

    def test_select_all(self):
        got = select_all_pivots({0: self.DOMAIN, 1: ["a b", "b c", "c d"]})
        assert set(got) == {0, 1}
        assert isinstance(got[0], AttributePivots)
        assert got[0].attr == 0 and got[1].attr == 1

    def test_main_tokens(self):
        got = select_pivots(["a b", "c d"], attr=0, seed=0)
        assert got.main_tokens == frozenset(got.main.split())
