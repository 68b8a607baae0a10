"""CDD rule semantics + imputation frequencies vs paper Examples 2-4."""
import pytest

from repro.core.cdd import (
    CDDRule,
    Constraint,
    combine_rules,
    impute_frequencies,
    normalize_freqs,
)

#: paper Table 2 repository (attributes A=const, B, C numeric)
R = [
    ("a1", 0.2, 0.1),
    ("a1", 0.3, 0.2),
    ("a1", 0.5, 0.35),
    ("a2", 0.7, 0.7),
]
DOM_C = [0.1, 0.2, 0.35, 0.7]


def numdist(a, b):
    return abs(a - b)


def cdd1():
    """CDD1: AB -> C, {a1, [0,0.1], [0,0.1]} (paper Example 2)."""
    return CDDRule(
        dependent=2,
        constraints=(
            Constraint(0, constant="a1"),
            Constraint(1, interval=(0.0, 0.1)),
        ),
        dep_interval=(0.0, 0.1),
    )


def cdd2():
    """CDD2: AB -> C, {a1, (0.1,0.2], [0,0.2]} (paper Example 4)."""
    return CDDRule(
        dependent=2,
        constraints=(
            Constraint(0, constant="a1"),
            Constraint(1, interval=(0.1 + 1e-12, 0.2)),
        ),
        dep_interval=(0.0, 0.2),
    )


class TestConstraint:
    def test_needs_exactly_one_kind(self):
        with pytest.raises(ValueError):
            Constraint(0)
        with pytest.raises(ValueError):
            Constraint(0, interval=(0.0, 0.1), constant="v")

    def test_interval_validation(self):
        with pytest.raises(ValueError):
            Constraint(0, interval=(0.5, 0.1))
        Constraint(0, interval=(0.0, 0.0))  # editing-rule equality is allowed

    def test_constant_satisfied(self):
        c = Constraint(0, constant="a1")
        assert c.satisfied("a1", "a1", numdist)
        assert not c.satisfied("a1", "a2", numdist)
        assert not c.satisfied("a2", "a2", numdist)  # must equal the constant

    def test_interval_satisfied(self):
        c = Constraint(1, interval=(0.0, 0.1))
        assert c.satisfied(0.3, 0.25, numdist)
        assert not c.satisfied(0.3, 0.45, numdist)

    def test_interval_min_relaxation(self):
        """Paper §2.2: eps.min may be > 0 (tighter bands)."""
        c = Constraint(1, interval=(0.1, 0.2))
        assert not c.satisfied(0.3, 0.35, numdist)   # dist 0.05 < 0.1
        assert c.satisfied(0.3, 0.45, numdist)       # dist 0.15 in band

    def test_missing_value_never_satisfies(self):
        c = Constraint(1, interval=(0.0, 1.0))
        assert not c.satisfied(None, 0.3, numdist)
        assert not c.satisfied(0.3, None, numdist)


class TestCDDRule:
    def test_dependent_not_determinant(self):
        with pytest.raises(ValueError):
            CDDRule(0, (Constraint(0, interval=(0.0, 0.1)),), (0.0, 0.1))

    def test_satisfies_example2(self):
        """Paper Example 2/3: r=(a1, 0.3, -) matches samples s1, s2 only."""
        r = ("a1", 0.3, None)
        rule = cdd1()
        matches = [s for s in R if rule.satisfies(r, s, numdist)]
        assert matches == [R[0], R[1]]

    def test_candidate_values_example3(self):
        rule = cdd1()
        assert rule.candidate_values(R[0], DOM_C, numdist) == [0.1, 0.2]
        assert rule.candidate_values(R[1], DOM_C, numdist) == [0.1, 0.2]

    def test_determinants_sorted(self):
        assert cdd1().determinants == (0, 1)


class TestImputationExample3:
    """Paper Example 3: single-CDD imputation probabilities = {1/2, 1/2}."""

    def test_frequencies(self):
        freqs = impute_frequencies(("a1", 0.3, None), [cdd1()], R, DOM_C, numdist)
        assert freqs == {0.1: 2, 0.2: 2}

    def test_probabilities(self):
        freqs = impute_frequencies(("a1", 0.3, None), [cdd1()], R, DOM_C, numdist)
        probs = normalize_freqs(freqs)
        assert probs == {0.1: pytest.approx(0.5), 0.2: pytest.approx(0.5)}


class TestImputationExample4:
    """Paper Example 4: two CDDs merge to {2/6, 3/6, 1/6}."""

    def test_cdd2_alone(self):
        freqs = impute_frequencies(("a1", 0.3, None), [cdd2()], R, DOM_C, numdist)
        assert freqs == {0.2: 1, 0.35: 1}

    def test_merged(self):
        freqs = impute_frequencies(
            ("a1", 0.3, None), [cdd1(), cdd2()], R, DOM_C, numdist
        )
        assert freqs == {0.1: 2, 0.2: 3, 0.35: 1}
        probs = normalize_freqs(freqs)
        assert probs[0.1] == pytest.approx(2 / 6)
        assert probs[0.2] == pytest.approx(3 / 6)
        assert probs[0.35] == pytest.approx(1 / 6)

    def test_empty_freqs(self):
        assert normalize_freqs({}) == {}


class TestCombineRules:
    def test_combine(self):
        a = CDDRule(2, (Constraint(0, interval=(0.0, 0.2)),), (0.0, 0.3))
        b = CDDRule(2, (Constraint(1, interval=(0.0, 0.1)),), (0.1, 0.4))
        c = combine_rules(a, b)
        assert c.level == 2
        assert c.dep_interval == (0.1, 0.3)
        assert c.determinants == (0, 1)

    def test_combine_different_dependents_raises(self):
        a = CDDRule(2, (Constraint(0, interval=(0.0, 0.2)),), (0.0, 0.3))
        b = CDDRule(1, (Constraint(0, interval=(0.0, 0.2)),), (0.0, 0.3))
        with pytest.raises(ValueError):
            combine_rules(a, b)

    def test_combine_disjoint_intervals_raises(self):
        a = CDDRule(2, (Constraint(0, interval=(0.0, 0.2)),), (0.0, 0.1))
        b = CDDRule(2, (Constraint(1, interval=(0.0, 0.1)),), (0.3, 0.4))
        with pytest.raises(ValueError):
            combine_rules(a, b)
