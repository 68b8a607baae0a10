"""F-score (Eq. 6) and pruning-power metric tests."""
import pytest

from repro.index.er_grid import PruneStats
from repro.ter.metrics import f_score, pruning_power


def P(*pairs):
    return {frozenset(p) for p in pairs}


class TestFScore:
    def test_perfect(self):
        t = P((1, 2), (3, 4))
        fs = f_score(t, t)
        assert fs.f == 1.0 and fs.precision == 1.0 and fs.recall == 1.0

    def test_half_precision(self):
        fs = f_score(P((1, 2), (5, 6)), P((1, 2)))
        assert fs.precision == 0.5 and fs.recall == 1.0
        assert fs.f == pytest.approx(2 * 0.5 / 1.5)

    def test_half_recall(self):
        fs = f_score(P((1, 2)), P((1, 2), (3, 4)))
        assert fs.precision == 1.0 and fs.recall == 0.5

    def test_empty_returned(self):
        fs = f_score(set(), P((1, 2)))
        assert fs.f == 0.0 and fs.precision == 0.0

    def test_empty_truth(self):
        fs = f_score(P((1, 2)), set())
        assert fs.recall == 0.0 and fs.f == 0.0

    def test_eq6_formula(self):
        fs = f_score(P((1, 2), (3, 4), (5, 6)), P((1, 2), (3, 4), (7, 8), (9, 10)))
        p, r = 2 / 3, 2 / 4
        assert fs.f == pytest.approx(2 * p * r / (p + r))

    def test_unordered_pairs(self):
        assert f_score(P((2, 1)), P((1, 2))).f == 1.0


class TestPruningPower:
    def test_fractions(self):
        st = PruneStats(
            total=1000, pruned_topic=800, pruned_sim=100, pruned_prob=30,
            pruned_instance=20,
        )
        pp = pruning_power(st)
        assert pp["topic"] == 0.8
        assert pp["sim_ub"] == 0.1
        assert pp["prob_ub"] == 0.03
        assert pp["instance"] == 0.02
        assert pp["total"] == pytest.approx(0.95)

    def test_zero_total(self):
        pp = pruning_power(PruneStats())
        assert pp["total"] == 0.0
