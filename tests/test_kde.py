"""Unit tests for the distribution primitives (repro.core.kde)."""
import numpy as np
import pytest

from repro.core.kde import EPS, Bernoulli, GaussianKDE, Histogram


class TestGaussianKDE:
    def test_fit_requires_data(self):
        with pytest.raises(ValueError):
            GaussianKDE.fit([])

    def test_fit_requires_finite(self):
        with pytest.raises(ValueError):
            GaussianKDE.fit([np.nan, np.inf])

    def test_pdf_integrates_to_one(self):
        kde = GaussianKDE.fit(np.random.default_rng(0).normal(10, 2, 500))
        xs = np.linspace(0, 20, 4001)
        integral = np.trapz(kde.pdf(xs), xs)
        assert integral == pytest.approx(1.0, abs=0.02)

    def test_pdf_peaks_near_mode(self):
        kde = GaussianKDE.fit(np.random.default_rng(1).normal(5.0, 1.0, 1000))
        xs = np.linspace(-5, 15, 2001)
        assert abs(xs[np.argmax(kde.pdf(xs))] - 5.0) < 0.5

    @pytest.mark.parametrize("mu,sd", [(0.0, 1.0), (13.7, 1.5), (100.0, 10.0)])
    def test_relative_likelihood_high_at_mode_low_in_tail(self, mu, sd):
        kde = GaussianKDE.fit(np.random.default_rng(2).normal(mu, sd, 800))
        at_mode = kde.relative_likelihood([mu])[0]
        in_tail = kde.relative_likelihood([mu + 10 * sd])[0]
        assert at_mode > 0.5
        assert in_tail < 1e-3
        assert in_tail >= EPS

    def test_relative_likelihood_bounded(self):
        kde = GaussianKDE.fit(np.random.default_rng(3).normal(0, 1, 300))
        vals = kde.relative_likelihood(np.linspace(-20, 20, 500))
        assert np.all(vals >= EPS) and np.all(vals <= 1.0)

    def test_log_relative_likelihood_matches(self):
        kde = GaussianKDE.fit(np.random.default_rng(4).uniform(0, 5, 200))
        x = np.linspace(-1, 6, 50)
        np.testing.assert_allclose(
            kde.log_relative_likelihood(x), np.log(kde.relative_likelihood(x))
        )

    def test_degenerate_constant_sample(self):
        kde = GaussianKDE.fit(np.full(50, 7.0))
        assert kde.relative_likelihood([7.0])[0] == pytest.approx(1.0, rel=1e-6)
        assert kde.relative_likelihood([8.0])[0] < 1e-6

    def test_subsampling_is_deterministic(self):
        data = np.random.default_rng(5).normal(0, 1, 10_000)
        a = GaussianKDE.fit(data, max_points=256, seed=9)
        b = GaussianKDE.fit(data, max_points=256, seed=9)
        np.testing.assert_array_equal(a.points, b.points)
        assert a.points.size == 256

    def test_vectorized_matches_scalar(self):
        kde = GaussianKDE.fit(np.random.default_rng(6).normal(2, 0.5, 100))
        xs = np.array([1.0, 2.0, 3.0])
        batch = kde.pdf(xs)
        singles = [kde.pdf([x])[0] for x in xs]
        np.testing.assert_allclose(batch, singles)

    def test_chunked_pdf_matches_unchunked(self):
        kde = GaussianKDE.fit(np.random.default_rng(7).normal(0, 1, 50))
        xs = np.random.default_rng(8).normal(0, 1, 10_000)  # spans chunks
        direct = kde.pdf(xs[:100])
        np.testing.assert_allclose(kde.pdf(xs)[:100], direct)

    def test_bimodal_support(self):
        data = np.concatenate(
            [np.random.default_rng(9).normal(0, 0.3, 400),
             np.random.default_rng(10).normal(10, 0.3, 400)]
        )
        kde = GaussianKDE.fit(data)
        assert kde.relative_likelihood([0.0])[0] > 0.3
        assert kde.relative_likelihood([10.0])[0] > 0.3
        assert kde.relative_likelihood([5.0])[0] < 0.05

    def test_picklable(self):
        import pickle

        kde = GaussianKDE.fit(np.random.default_rng(11).normal(0, 1, 100))
        kde2 = pickle.loads(pickle.dumps(kde))
        x = np.linspace(-2, 2, 11)
        np.testing.assert_allclose(kde.pdf(x), kde2.pdf(x))


class TestBernoulli:
    def test_fit_empty_raises(self):
        with pytest.raises(ValueError):
            Bernoulli.fit([])

    @pytest.mark.parametrize("p", [0.1, 0.5, 0.9])
    def test_fit_recovers_rate(self, p):
        rng = np.random.default_rng(12)
        b = Bernoulli.fit((rng.random(5000) < p).astype(float))
        assert b.p == pytest.approx(p, abs=0.03)

    def test_likelihood_of_each_outcome(self):
        b = Bernoulli(p=0.8)
        assert b.relative_likelihood([1.0])[0] == pytest.approx(0.8)
        assert b.relative_likelihood([0.0])[0] == pytest.approx(0.2)

    def test_degenerate_rate_clipped(self):
        b = Bernoulli.fit(np.ones(100))
        assert 0 < b.p < 1


class TestHistogram:
    def test_fit_empty_raises(self):
        with pytest.raises(ValueError):
            Histogram.fit([])

    def test_uniform_data_flat(self):
        h = Histogram.fit(np.random.default_rng(13).uniform(0, 1, 20_000), bins=10)
        assert np.all(h.relative_likelihood(np.linspace(0.05, 0.95, 10)) > 0.7)

    def test_out_of_support_is_eps(self):
        h = Histogram.fit(np.random.default_rng(14).uniform(0, 1, 1000))
        assert h.relative_likelihood([5.0])[0] == EPS
        assert h.relative_likelihood([-5.0])[0] == EPS

    def test_mode_bin_is_one(self):
        h = Histogram.fit(np.random.default_rng(15).normal(0, 1, 10_000), bins=21)
        assert h.relative_likelihood([0.0])[0] == pytest.approx(1.0, abs=0.05)
