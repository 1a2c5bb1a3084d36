"""Unit tests for the synthetic ER data substrate (pure pandas/numpy)."""
import numpy as np
import pandas as pd
import pytest

from repro.er_data.generator import ERConfig, clean_clean, dirty
from repro.er_data.datasets import (
    CLEAN_CLEAN_ANALOGS,
    SCALABILITY_ANALOGS,
    analog_pandas,
)

CFG = ERConfig(n_matches=50, n_only1=10, n_only2=20, vocab_size=500, seed=3)


class TestCleanClean:
    def test_sizes(self):
        ent, gt = clean_clean(CFG)
        assert len(ent) == (50 + 10) + (50 + 20)
        assert len(gt) == 50

    def test_ids_unique_and_contiguous(self):
        ent, _ = clean_clean(CFG)
        assert ent["entity_id"].is_unique
        assert set(ent["entity_id"]) == set(range(130))

    def test_sources(self):
        ent, _ = clean_clean(CFG)
        assert (ent[ent["entity_id"] < 60]["source"] == 1).all()
        assert (ent[ent["entity_id"] >= 60]["source"] == 2).all()

    def test_ground_truth_references_valid_cross_source_ids(self):
        ent, gt = clean_clean(CFG)
        src = ent.set_index("entity_id")["source"]
        assert (gt["id1"].map(src) == 1).all()
        assert (gt["id2"].map(src) == 2).all()

    def test_deterministic_in_seed(self):
        a_ent, a_gt = clean_clean(CFG)
        b_ent, b_gt = clean_clean(CFG)
        pd.testing.assert_frame_equal(a_ent, b_ent)
        pd.testing.assert_frame_equal(a_gt, b_gt)

    def test_different_seed_differs(self):
        other = ERConfig(**{**CFG.__dict__, "seed": 4})
        assert not clean_clean(CFG)[0].equals(clean_clean(other)[0])

    def test_duplicates_share_tokens(self):
        """The redundancy-positive premise: most matches overlap in >=1
        descriptive token."""
        ent, gt = clean_clean(CFG)
        text = ent.set_index("entity_id")["text"]
        share = 0
        for _, row in gt.iterrows():
            t1 = {t for t in text[row.id1].split() if t.startswith("t")}
            t2 = {t for t in text[row.id2].split() if t.startswith("t")}
            share += bool(t1 & t2)
        assert share / len(gt) > 0.8

    def test_noise_reduces_overlap(self):
        noisy = ERConfig(**{**CFG.__dict__, "p_drop": 0.6, "p_noise": 0.3})
        def mean_overlap(cfg):
            ent, gt = clean_clean(cfg)
            text = ent.set_index("entity_id")["text"]
            tot = 0.0
            for _, row in gt.iterrows():
                t1 = {t for t in text[row.id1].split() if t.startswith("t")}
                t2 = {t for t in text[row.id2].split() if t.startswith("t")}
                tot += len(t1 & t2)
            return tot / len(gt)
        assert mean_overlap(noisy) < mean_overlap(CFG)

    def test_extra_tokens_lengthen_source2(self):
        cfg = ERConfig(**{**CFG.__dict__, "extra_tokens_2": 5})
        ent, _ = clean_clean(cfg)
        n1 = ent[ent["source"] == 1]["text"].str.split().str.len().mean()
        n2 = ent[ent["source"] == 2]["text"].str.split().str.len().mean()
        assert n2 > n1 + 3

    def test_common_pool_tokens_present(self):
        ent, _ = clean_clean(CFG)
        has_common = ent["text"].str.contains(r"\bc\d{3}\b").mean()
        assert has_common > 0.9


class TestDirty:
    def test_sizes(self):
        cfg = ERConfig(n_matches=30, n_only1=40, seed=9)
        ent, gt = dirty(cfg)
        assert len(ent) == 30 + 40 + 30
        assert len(gt) == 30

    def test_gt_ordering_and_validity(self):
        cfg = ERConfig(n_matches=30, n_only1=40, seed=9)
        ent, gt = dirty(cfg)
        assert (gt["id1"] < gt["id2"]).all()
        assert gt["id1"].isin(ent["entity_id"]).all()
        assert gt["id2"].isin(ent["entity_id"]).all()

    def test_single_source(self):
        ent, _ = dirty(ERConfig(n_matches=30, n_only1=40, seed=9))
        assert (ent["source"] == 1).all()

    def test_deterministic(self):
        cfg = ERConfig(n_matches=25, n_only1=10, seed=11)
        pd.testing.assert_frame_equal(dirty(cfg)[0], dirty(cfg)[0])


class TestAnalogCatalog:
    @pytest.mark.parametrize("name", list(CLEAN_CLEAN_ANALOGS))
    def test_clean_analog_materialises(self, name):
        ent, gt, task = analog_pandas(name)
        assert task == "clean"
        cfg = CLEAN_CLEAN_ANALOGS[name]
        assert len(gt) == cfg.n_matches
        assert len(ent) == 2 * cfg.n_matches + cfg.n_only1 + cfg.n_only2

    @pytest.mark.parametrize("name", list(SCALABILITY_ANALOGS))
    def test_dirty_analog_materialises(self, name):
        ent, gt, task = analog_pandas(name)
        assert task == "dirty"
        assert len(gt) == SCALABILITY_ANALOGS[name].n_matches

    def test_scalability_sizes_increase(self):
        sizes = [
            len(analog_pandas(n)[0]) for n in SCALABILITY_ANALOGS
        ]
        assert sizes == sorted(sizes)
        assert sizes[-1] > 10 * sizes[0]

    def test_unknown_name_raises(self):
        with pytest.raises(KeyError):
            analog_pandas("NoSuchDataset")

    def test_seed_override(self):
        a = analog_pandas("D10K", seed=1)[0]
        b = analog_pandas("D10K", seed=2)[0]
        assert not a.equals(b)
