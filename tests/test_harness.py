"""Tests for the experiment harness (grid evaluation + markdown)."""
import pandas as pd
import pytest

from repro.core.pipeline import FEATURES_21, FEATURES_BLAST, prepare_dataset
from repro.er_data.generator import ERConfig, clean_clean, to_spark
from repro.eval.harness import MethodSpec, evaluate_grid, summarize, to_markdown


@pytest.fixture(scope="module")
def tiny_arts(spark):
    ent, gt = clean_clean(
        ERConfig(n_matches=40, n_only1=10, n_only2=10, vocab_size=500, seed=13)
    )
    return {
        "tiny": prepare_dataset(
            spark, "tiny", to_spark(spark, ent), to_spark(spark, gt), "clean"
        )
    }


class TestEvaluateGrid:
    def test_grid_shape_and_columns(self, tiny_arts):
        specs = [
            MethodSpec("BLAST", "BLAST", FEATURES_BLAST, 10),
            MethodSpec("BCl", "BCl", FEATURES_21, 10),
        ]
        grid = evaluate_grid(tiny_arts, specs, seeds=[1, 2])
        assert len(grid) == 4
        assert set(grid["method"]) == {"BLAST", "BCl"}
        assert grid["recall"].between(0, 1).all()
        assert (grid["rt_s"] > 0).all()

    def test_summarize_means_over_seeds(self, tiny_arts):
        specs = [MethodSpec("BCl", "BCl", FEATURES_21, 10)]
        grid = evaluate_grid(tiny_arts, specs, seeds=[1, 2, 3])
        s = summarize(grid)
        assert len(s) == 1
        assert s.loc[0, "recall"] == pytest.approx(grid["recall"].mean())


class TestToMarkdown:
    def test_renders_gfm(self):
        df = pd.DataFrame({"a": [1, 2], "b": [0.5, 0.25]})
        md = to_markdown(df)
        lines = md.splitlines()
        assert lines[0] == "| a | b |"
        assert lines[1] == "|---|---|"
        assert lines[2] == "| 1 | 0.5000 |"

    def test_custom_float_format(self):
        df = pd.DataFrame({"x": [0.123456]})
        assert "0.12" in to_markdown(df, floatfmt="%.2f")
