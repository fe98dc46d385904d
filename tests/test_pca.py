"""PCA via the sampled correlation-matrix sketch."""
import numpy as np
import pandas as pd
import pytest

from repro.core.pca import CorrelationSketch, pca_sample_size
from repro.core.sketch import leaf_rng


@pytest.fixture(scope="module")
def correlated_pdf():
    g = np.random.default_rng(5)
    n = 20_000
    base = g.normal(0, 1, n)
    return pd.DataFrame(
        {
            "a": base,
            "b": base * 2 + g.normal(0, 0.1, n),  # strongly correlated with a
            "c": g.normal(0, 1, n),  # independent
        }
    )


class TestCorrelationSketch:
    def test_exact_matches_numpy(self, correlated_pdf):
        sk = CorrelationSketch(["a", "b", "c"], sample=False)
        s = sk.summarize(correlated_pdf, leaf_rng(0, 0))
        corr = sk.correlation_matrix(s)
        expected = np.corrcoef(correlated_pdf.to_numpy().T)
        assert np.allclose(corr, expected, atol=1e-8)

    def test_sampled_close(self, correlated_pdf):
        sk = CorrelationSketch(["a", "b", "c"], total_rows=len(correlated_pdf))
        s = sk.summarize(correlated_pdf, leaf_rng(1, 0))
        corr = sk.correlation_matrix(s)
        expected = np.corrcoef(correlated_pdf.to_numpy().T)
        assert np.abs(corr - expected).max() < 0.05

    def test_mergeability(self, correlated_pdf):
        parts = [correlated_pdf.iloc[i::3] for i in range(3)]
        sk = CorrelationSketch(["a", "b", "c"], sample=False)
        merged = sk.summarize_all(parts)
        whole = sk.summarize(correlated_pdf, leaf_rng(0, 0))
        assert merged.n == whole.n
        assert np.allclose(merged.gram, whole.gram)

    def test_principal_components_find_correlated_direction(self, correlated_pdf):
        sk = CorrelationSketch(["a", "b", "c"], sample=False)
        s = sk.summarize(correlated_pdf, leaf_rng(0, 0))
        vals, vecs = sk.principal_components(s, 2)
        # First PC loads on a and b (the correlated pair), not c.
        assert vals[0] > 1.8  # ~2 for a perfect pair
        assert abs(vecs[0][0]) > 0.5 and abs(vecs[0][1]) > 0.5
        assert abs(vecs[0][2]) < 0.2

    def test_eigenvalues_descending(self, correlated_pdf):
        sk = CorrelationSketch(["a", "b", "c"], sample=False)
        vals, _ = sk.principal_components(
            sk.summarize(correlated_pdf, leaf_rng(0, 0)), 3
        )
        assert list(vals) == sorted(vals, reverse=True)

    def test_sign_deterministic(self, correlated_pdf):
        sk = CorrelationSketch(["a", "b", "c"], sample=False)
        s = sk.summarize(correlated_pdf, leaf_rng(0, 0))
        _, v1 = sk.principal_components(s, 2)
        _, v2 = sk.principal_components(s, 2)
        assert np.array_equal(v1, v2)

    def test_flights_delays_correlated(self, fl_pdf, fl_parts):
        sk = CorrelationSketch(["dep_delay", "arr_delay"], sample=False)
        corr = sk.correlation_matrix(sk.summarize_all(fl_parts))
        assert corr[0, 1] > 0.5  # arrival delay tracks departure delay

    def test_too_few_rows_raises(self):
        sk = CorrelationSketch(["a"], sample=False)
        with pytest.raises(ValueError):
            sk.correlation_matrix(sk.zero())

    def test_needs_columns(self):
        with pytest.raises(ValueError):
            CorrelationSketch([])

    def test_sample_size_scales_with_columns(self):
        assert pca_sample_size(2) < pca_sample_size(10)
