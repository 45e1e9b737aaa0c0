"""Unit tests for the special-function substrate (no scipy on board, so
these verify against closed forms and math-module references)."""
import math

import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.stats.special import betainc_reg, log_gamma


class TestLogGamma:
    @pytest.mark.parametrize("x", [0.5, 1.0, 1.5, 2.0, 3.7, 10.0, 42.5, 171.0, 0.1])
    def test_matches_math_lgamma(self, x):
        assert log_gamma(x) == pytest.approx(math.lgamma(x), rel=1e-12)

    def test_gamma_of_one_is_zero(self):
        assert log_gamma(1.0) == pytest.approx(0.0, abs=1e-12)

    def test_gamma_of_half_is_sqrt_pi(self):
        assert math.exp(log_gamma(0.5)) == pytest.approx(math.sqrt(math.pi), rel=1e-12)

    def test_factorial_recurrence(self):
        for n in range(1, 15):
            assert math.exp(log_gamma(n + 1)) == pytest.approx(
                math.factorial(n), rel=1e-10
            )

    @pytest.mark.parametrize("x", [0.0, -1.0, -0.5])
    def test_rejects_nonpositive(self, x):
        with pytest.raises(ValueError):
            log_gamma(x)

    @given(st.floats(min_value=0.05, max_value=50.0))
    @settings(max_examples=50, deadline=None)
    def test_property_matches_lgamma(self, x):
        assert log_gamma(x) == pytest.approx(math.lgamma(x), rel=1e-9, abs=1e-9)


class TestBetaIncReg:
    def test_bounds(self):
        assert betainc_reg(2.0, 3.0, 0.0) == 0.0
        assert betainc_reg(2.0, 3.0, 1.0) == 1.0

    def test_uniform_case(self):
        # I_x(1, 1) = x.
        for x in (0.1, 0.25, 0.5, 0.9):
            assert betainc_reg(1.0, 1.0, x) == pytest.approx(x, rel=1e-12)

    def test_symmetry(self):
        # I_x(a, b) = 1 - I_{1-x}(b, a).
        for a, b, x in [(2.0, 5.0, 0.3), (0.5, 0.5, 0.7), (10.0, 1.5, 0.2)]:
            assert betainc_reg(a, b, x) == pytest.approx(
                1.0 - betainc_reg(b, a, 1.0 - x), rel=1e-10
            )

    def test_arcsine_closed_form(self):
        # I_x(1/2, 1/2) = (2/pi) arcsin(sqrt(x)).
        for x in (0.1, 0.4, 0.8):
            assert betainc_reg(0.5, 0.5, x) == pytest.approx(
                2.0 / math.pi * math.asin(math.sqrt(x)), rel=1e-10
            )

    def test_binomial_identity(self):
        # I_x(a, 1) = x^a.
        for a, x in [(3.0, 0.5), (7.5, 0.9)]:
            assert betainc_reg(a, 1.0, x) == pytest.approx(x**a, rel=1e-10)

    @given(
        st.floats(min_value=0.2, max_value=20.0),
        st.floats(min_value=0.2, max_value=20.0),
        st.floats(min_value=0.01, max_value=0.99),
        st.floats(min_value=0.01, max_value=0.99),
    )
    @settings(max_examples=50, deadline=None)
    def test_property_monotone_in_x(self, a, b, x1, x2):
        lo, hi = sorted((x1, x2))
        assert betainc_reg(a, b, lo) <= betainc_reg(a, b, hi) + 1e-12

    @given(
        st.floats(min_value=0.2, max_value=20.0),
        st.floats(min_value=0.2, max_value=20.0),
        st.floats(min_value=0.0, max_value=1.0),
    )
    @settings(max_examples=50, deadline=None)
    def test_property_in_unit_interval(self, a, b, x):
        v = betainc_reg(a, b, x)
        assert -1e-12 <= v <= 1.0 + 1e-12

    @pytest.mark.parametrize("a,b", [(0.0, 1.0), (-1.0, 2.0), (1.0, 0.0)])
    def test_rejects_bad_shape(self, a, b):
        with pytest.raises(ValueError):
            betainc_reg(a, b, 0.5)

    def test_rejects_x_outside_unit(self):
        with pytest.raises(ValueError):
            betainc_reg(1.0, 1.0, 1.5)
