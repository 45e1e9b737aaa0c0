"""Unit tests for the Student-t substrate and the one-sample t-test."""
import math

import numpy as np
import pytest

from repro.stats.ttest import (
    one_sample_ttest,
    t_cdf,
    t_ppf,
    t_sf,
    ttest_from_stats,
)


def _norm_cdf(x: float) -> float:
    return 0.5 * (1.0 + math.erf(x / math.sqrt(2.0)))


class TestTCdf:
    def test_df1_is_cauchy(self):
        # t with df=1 is Cauchy: CDF = 1/2 + arctan(t)/pi.
        for t in (-3.0, -0.5, 0.0, 1.0, 5.0):
            assert t_cdf(t, 1) == pytest.approx(
                0.5 + math.atan(t) / math.pi, rel=1e-9, abs=1e-9
            )

    def test_df2_closed_form(self):
        # CDF(t; 2) = 1/2 + t / (2*sqrt(2 + t^2)).
        for t in (-2.0, 0.3, 4.0):
            assert t_cdf(t, 2) == pytest.approx(
                0.5 + t / (2.0 * math.sqrt(2.0 + t * t)), rel=1e-9
            )

    def test_large_df_approaches_normal(self):
        for t in (-1.96, 0.0, 1.0, 2.5):
            assert t_cdf(t, 100000) == pytest.approx(_norm_cdf(t), abs=1e-4)

    def test_symmetry(self):
        for df in (1, 5, 30):
            for t in (0.7, 2.2):
                assert t_cdf(-t, df) == pytest.approx(1.0 - t_cdf(t, df), abs=1e-12)

    def test_at_zero(self):
        assert t_cdf(0.0, 7) == 0.5

    def test_known_critical_value(self):
        # t_{0.975, 10} = 2.228139 (standard tables).
        assert t_sf(2.228139, 10) == pytest.approx(0.025, abs=1e-4)

    def test_rejects_bad_df(self):
        with pytest.raises(ValueError):
            t_cdf(1.0, 0)


class TestTPpf:
    @pytest.mark.parametrize("df", [1, 2, 5, 30, 200])
    @pytest.mark.parametrize("q", [0.05, 0.5, 0.8, 0.975, 0.999])
    def test_roundtrip(self, df, q):
        assert t_cdf(t_ppf(q, df), df) == pytest.approx(q, abs=1e-7)

    def test_known_quantiles(self):
        assert t_ppf(0.975, 10) == pytest.approx(2.228139, abs=1e-4)
        assert t_ppf(0.95, 5) == pytest.approx(2.015048, abs=1e-4)
        assert t_ppf(0.5, 3) == pytest.approx(0.0, abs=1e-9)

    def test_rejects_bad_q(self):
        with pytest.raises(ValueError):
            t_ppf(0.0, 5)
        with pytest.raises(ValueError):
            t_ppf(1.0, 5)


class TestOneSampleTTest:
    def test_known_example(self):
        # Hand-checked: xs mean=5.0, std=sqrt(2.5), n=5 vs c=3 ->
        # t = 2 / (sqrt(2.5)/sqrt(5)) = 2.8284.
        xs = [3.0, 4.0, 5.0, 6.0, 7.0]
        r = one_sample_ttest(xs, 3.0, alternative="greater")
        assert r.mean == pytest.approx(5.0)
        assert r.t_stat == pytest.approx(2.8284, abs=1e-3)
        assert r.p_value == pytest.approx(0.0237, abs=2e-3)  # sf(2.828, df=4)
        assert r.significant()

    def test_two_sided_doubles_tail(self):
        xs = [3.0, 4.0, 5.0, 6.0, 7.0]
        g = one_sample_ttest(xs, 3.0, alternative="greater")
        two = one_sample_ttest(xs, 3.0, alternative="two-sided")
        assert two.p_value == pytest.approx(2 * g.p_value, rel=1e-9)

    def test_less_alternative(self):
        xs = [1.0, 2.0, 3.0]
        r = one_sample_ttest(xs, 10.0, alternative="less")
        assert r.p_value < 0.05

    def test_ci_contains_mean(self):
        rng = np.random.default_rng(0)
        xs = rng.normal(10, 2, 50).tolist()
        r = one_sample_ttest(xs, 9.0)
        assert r.ci_low < r.mean < r.ci_high

    def test_ci_width_shrinks_with_n(self):
        rng = np.random.default_rng(1)
        small = one_sample_ttest(rng.normal(0, 1, 10).tolist(), 0)
        big = one_sample_ttest(rng.normal(0, 1, 1000).tolist(), 0)
        assert (big.ci_high - big.ci_low) < (small.ci_high - small.ci_low)

    def test_single_value_never_significant(self):
        r = one_sample_ttest([5.0], 1.0)
        assert r.p_value == 1.0

    def test_empty_raises(self):
        with pytest.raises(ValueError):
            one_sample_ttest([], 0.0)

    def test_constant_values_degenerate(self):
        r = one_sample_ttest([4.0, 4.0, 4.0], 1.0, alternative="greater")
        assert r.p_value == 0.0
        r2 = one_sample_ttest([4.0, 4.0, 4.0], 9.0, alternative="greater")
        assert r2.p_value == 1.0

    def test_unknown_alternative(self):
        with pytest.raises(ValueError):
            one_sample_ttest([1.0, 2.0], 0.0, alternative="sideways")


class TestFromStats:
    def test_matches_value_version(self):
        xs = [3.0, 4.0, 5.0, 6.0, 7.0]
        a = one_sample_ttest(xs, 3.0)
        b = ttest_from_stats(5, 5.0, math.sqrt(2.5), 3.0)
        assert a.p_value == pytest.approx(b.p_value, rel=1e-12)
        assert a.ci_low == pytest.approx(b.ci_low, rel=1e-9)

    def test_rejects_zero_n(self):
        with pytest.raises(ValueError):
            ttest_from_stats(0, 0.0, 1.0, 0.0)

    def test_p_decreases_with_n(self):
        ps = [ttest_from_stats(n, 1.0, 2.0, 0.0).p_value for n in (5, 50, 500)]
        assert ps[0] > ps[1] > ps[2]
