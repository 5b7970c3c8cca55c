"""Tests for the six synthetic datasets (repro.experiments.datasets)."""
import pandas as pd
import pytest

from repro.experiments.datasets import DATASET_NAMES, make_stream, summary_table


class TestMakeStream:
    def test_six_datasets(self):
        assert len(DATASET_NAMES) == 6

    @pytest.mark.parametrize("name", DATASET_NAMES)
    def test_stream_shape(self, name):
        pdf = make_stream(name, 250)
        assert list(pdf.columns) == ["u", "v", "t"]
        assert len(pdf) == 250
        assert (pdf["u"] != pdf["v"]).all()

    @pytest.mark.parametrize("name", DATASET_NAMES)
    def test_deterministic(self, name):
        pd.testing.assert_frame_equal(make_stream(name, 100), make_stream(name, 100))

    def test_datasets_differ(self):
        frames = [make_stream(n, 200) for n in DATASET_NAMES]
        for i in range(len(frames)):
            for j in range(i + 1, len(frames)):
                assert not frames[i].equals(frames[j])

    def test_unknown_name(self):
        with pytest.raises(ValueError):
            make_stream("nope", 10)


class TestSummary:
    def test_table_i_analog(self):
        t = summary_table(300)
        assert list(t.columns) == ["dataset", "n_nodes", "n_interactions"]
        assert (t["n_interactions"] == 300).all()
        assert (t["n_nodes"] > 0).all()

    def test_stackoverflow_broader_than_twitter(self):
        """Relative dataset character (paper Table I): the SO pair spreads
        interactions over more nodes than the Twitter pair."""
        t = summary_table(2000).set_index("dataset")
        assert (
            t.loc["stackoverflow-c2a", "n_nodes"]
            > t.loc["twitter-hk", "n_nodes"]
        )
