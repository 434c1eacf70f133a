"""Synthetic interaction-network generators (dataset substitutes)."""
import numpy as np
import pandas as pd
import pytest

from repro.synth_data import _NETWORK_PROFILES, interaction_network, interaction_network_pdf


class TestProfiles:
    def test_three_paper_datasets_present(self):
        assert set(_NETWORK_PROFILES) == {"bitcoin", "ctu13", "prosper"}

    def test_unknown_profile_raises(self):
        with pytest.raises(ValueError):
            interaction_network_pdf(profile="enron")

    @pytest.mark.parametrize("profile", ["bitcoin", "ctu13", "prosper"])
    def test_deterministic(self, profile):
        a = interaction_network_pdf(profile=profile, sf=0.01, seed=7)
        b = interaction_network_pdf(profile=profile, sf=0.01, seed=7)
        pd.testing.assert_frame_equal(a, b)

    @pytest.mark.parametrize("profile", ["bitcoin", "ctu13", "prosper"])
    def test_seed_changes_data(self, profile):
        a = interaction_network_pdf(profile=profile, sf=0.01, seed=7)
        b = interaction_network_pdf(profile=profile, sf=0.01, seed=8)
        assert not a.equals(b)

    def test_scale_factor_scales_interactions(self):
        small = interaction_network_pdf(profile="bitcoin", sf=0.01)
        big = interaction_network_pdf(profile="bitcoin", sf=0.05)
        assert len(big) > 3 * len(small)


class TestInvariants:
    @pytest.fixture(scope="class")
    def pdf(self):
        return interaction_network_pdf(profile="bitcoin", sf=0.01, seed=7)

    def test_schema(self, pdf):
        assert list(pdf.columns) == ["src", "dst", "ts", "qty"]
        assert pdf["src"].dtype == np.int64
        assert pdf["ts"].dtype == np.int64

    def test_no_self_loops(self, pdf):
        assert (pdf["src"] != pdf["dst"]).all()

    def test_positive_quantities(self, pdf):
        assert (pdf["qty"] > 0).all()

    def test_avg_qty_matches_paper_column(self, pdf):
        # Bitcoin's Table-4 "avg. flow" is 34.4.
        assert pdf["qty"].mean() == pytest.approx(34.4, rel=0.05)

    def test_no_duplicate_interactions(self, pdf):
        assert not pdf.duplicated(subset=["src", "dst", "ts"]).any()

    def test_reciprocal_edges_exist(self, pdf):
        e = pdf[["src", "dst"]].drop_duplicates()
        rev = e.rename(columns={"src": "dst", "dst": "src"})
        both = e.merge(rev, on=["src", "dst"])
        assert len(both) > 0  # 2-hop cycles are the experiments' raw material

    def test_degree_skew(self, pdf):
        deg = pdf.groupby("src").size()
        assert deg.max() > 5 * max(deg.median(), 1)


class TestSparkSide:
    def test_spark_frame_matches_pandas(self, spark):
        df = interaction_network(spark, profile="ctu13", sf=0.01, seed=7)
        pdf = interaction_network_pdf(profile="ctu13", sf=0.01, seed=7)
        got = df.toPandas().sort_values(["src", "dst", "ts"]).reset_index(drop=True)
        pd.testing.assert_frame_equal(got, pdf, check_dtype=False)
