"""Synthetic Criteo-like impression log tests."""
import numpy as np
import pandas as pd

from repro.streams.criteo import (
    ALPHAS,
    CARDINALITIES,
    FEATURES,
    N_FEATURES,
    impressions_pdf,
    marginal_value,
    tuple_item_column,
)


class TestGenerator:
    def test_schema(self):
        pdf = impressions_pdf(1000, seed=0)
        assert list(pdf.columns) == list(FEATURES) + ["click"]
        assert len(pdf) == 1000

    def test_deterministic_in_seed(self):
        a = impressions_pdf(500, seed=7)
        b = impressions_pdf(500, seed=7)
        pd.testing.assert_frame_equal(a, b)

    def test_values_within_cardinality(self):
        pdf = impressions_pdf(2000, seed=1)
        for f, card in zip(FEATURES, CARDINALITIES):
            assert pdf[f].between(0, card - 1).all()

    def test_click_binary_and_plausible_rate(self):
        pdf = impressions_pdf(5000, seed=2)
        assert set(pdf["click"].unique()) <= {0, 1}
        assert 0.005 < pdf["click"].mean() < 0.3

    def test_marginals_skewed(self):
        pdf = impressions_pdf(20_000, seed=3)
        for f, card in zip(FEATURES, CARDINALITIES):
            top_frac = pdf[f].value_counts(normalize=True).iloc[0]
            assert top_frac > 2.0 / card  # far above uniform

    def test_mostly_disaggregated(self):
        # nearly all 9-feature tuples occur only a handful of times
        pdf = impressions_pdf(20_000, seed=4)
        items = tuple_item_column(pdf)
        vc = items.value_counts()
        assert vc.median() <= 3


class TestEncoding:
    def test_roundtrip_all_features(self):
        pdf = impressions_pdf(3000, seed=5)
        items = tuple_item_column(pdf).to_numpy()
        for f in range(N_FEATURES):
            decoded = marginal_value(items, f)
            assert (decoded == pdf[FEATURES[f]].to_numpy()).all()

    def test_encoding_injective(self):
        pdf = impressions_pdf(5000, seed=6)
        items = tuple_item_column(pdf)
        tuples = pdf[list(FEATURES)].apply(tuple, axis=1)
        assert items.nunique() == tuples.nunique()

    def test_no_overflow(self):
        # mixed-radix capacity must fit int64
        cap = 1
        for c in CARDINALITIES:
            cap *= c
        assert cap < 2**63
