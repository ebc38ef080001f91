"""Precision/recall/F1 and G-recall metrics (§8.3, §8.4)."""
import pytest

from repro.core.dc import DenialConstraint
from repro.core.predicates import Op, Predicate
from repro.metrics import PRF, g_recall, prf

P = Predicate
A = DenialConstraint.of(P("a", Op.EQ, "a"))
B = DenialConstraint.of(P("b", Op.EQ, "b"))
AB = DenialConstraint.of(P("a", Op.EQ, "a"), P("b", Op.NE, "b"))


class TestPRF:
    def test_perfect(self):
        r = prf([A, B], [A, B])
        assert r.precision == r.recall == r.f1 == 1.0

    def test_half_precision(self):
        r = prf([A, B], [A])
        assert r.precision == 0.5 and r.recall == 1.0
        assert r.f1 == pytest.approx(2 / 3)

    def test_half_recall(self):
        r = prf([A], [A, B])
        assert r.precision == 1.0 and r.recall == 0.5

    def test_disjoint(self):
        r = prf([A], [B])
        assert r.precision == r.recall == r.f1 == 0.0

    def test_empty_found(self):
        r = prf([], [A])
        assert r.precision == 0.0 and r.recall == 0.0 and r.f1 == 0.0

    def test_both_empty(self):
        r = prf([], [])
        assert r.f1 == 1.0

    def test_prf_uses_set_identity_not_object_identity(self):
        clone = DenialConstraint.of(P("a", Op.EQ, "a"))
        assert prf([clone], [A]).f1 == 1.0


class TestGRecall:
    def test_exact_hit(self):
        assert g_recall([AB], [AB]) == 1.0

    def test_generalization_counts(self):
        # A ⊂ AB: A is more general and implies AB → counted
        assert g_recall([A], [AB]) == 1.0

    def test_generalization_excluded_in_exact_mode(self):
        assert g_recall([A], [AB], exact=True) == 0.0

    def test_specialization_does_not_count(self):
        assert g_recall([AB], [A]) == 0.0

    def test_fraction(self):
        assert g_recall([A], [A, B]) == 0.5

    def test_empty_golden(self):
        assert g_recall([A], []) == 1.0

    def test_empty_found(self):
        assert g_recall([], [A, B]) == 0.0
