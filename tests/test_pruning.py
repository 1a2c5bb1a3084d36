"""Pruning-algorithm tests: hand-computed retention on a crafted scored
graph, Spark vs pandas local-engine equivalence on the same input, and the
set-algebra relations between algorithms.

Fixture graph (id1 in {1,2,3}, id2 in {11,12,13}):

    (1,11,.90) (1,12,.60) (2,11,.70) (2,12,.40) (3,12,.55) (3,13,.80) (1,13,.30)

Valid pairs (p>=0.5): five; global mean .71. Hand-derived results per
algorithm are in the EXPECTED table below (arithmetic in test_pruning
docstrings of each case).
"""
import pandas as pd
import pytest

from repro.core import bcl, blast, cep, cnp, rcnp, rwnp, wep, wnp
from repro.core.local_engine import prune_local

SCORED = pd.DataFrame(
    [
        (1, 11, 0.90),
        (1, 12, 0.60),
        (2, 11, 0.70),
        (2, 12, 0.40),
        (3, 12, 0.55),
        (3, 13, 0.80),
        (1, 13, 0.30),
    ],
    columns=["id1", "id2", "p"],
)

#: algorithm -> (kwargs, expected retained set)
EXPECTED = {
    # all valid pairs
    "BCl": ({}, {(1, 11), (1, 12), (2, 11), (3, 12), (3, 13)}),
    # global mean over valid = 3.55/5 = .71 -> keep .9, .8
    "WEP": ({}, {(1, 11), (3, 13)}),
    # entity means: e1=.75 e2=.70 e3=.675 e11=.80 e12=.575 e13=.80
    "WNP": ({}, {(1, 11), (1, 12), (2, 11), (3, 13)}),
    "RWNP": ({}, {(1, 11), (3, 13)}),
    # maxima: e1=.9 e2=.7 e3=.8 e11=.9 e12=.6 e13=.8; r=.35 keeps all valid
    "BLAST": ({"r": 0.35}, {(1, 11), (1, 12), (2, 11), (3, 12), (3, 13)}),
    # r=.5: thresholds .9 .75 .8 .7 .8 -> keep (1,11) and (3,13)
    "BLAST_r05": ({"r": 0.5}, {(1, 11), (3, 13)}),
    # top-3 by p
    "CEP": ({"K": 3}, {(1, 11), (3, 13), (2, 11)}),
    "CEP_all": ({"K": 10}, {(1, 11), (1, 12), (2, 11), (3, 12), (3, 13)}),
    # per-entity top-1 lists: e1:(1,11) e2:(2,11) e3:(3,13) e11:(1,11)
    # e12:(1,12) e13:(3,13); union / intersection:
    "CNP": ({"k": 1}, {(1, 11), (2, 11), (3, 13), (1, 12)}),
    "RCNP": ({"k": 1}, {(1, 11), (3, 13)}),
    "CNP_k2": ({"k": 2}, {(1, 11), (1, 12), (2, 11), (3, 12), (3, 13)}),
    "RCNP_k2": ({"k": 2}, {(1, 11), (1, 12), (2, 11), (3, 12), (3, 13)}),
}

_SPARK_FNS = {
    "BCl": bcl, "WEP": wep, "WNP": wnp, "RWNP": rwnp,
    "BLAST": blast, "BLAST_r05": blast,
    "CEP": cep, "CEP_all": cep, "CNP": cnp, "RCNP": rcnp,
    "CNP_k2": cnp, "RCNP_k2": rcnp,
}
_LOCAL_NAME = {
    "BLAST_r05": "BLAST", "CEP_all": "CEP", "CNP_k2": "CNP", "RCNP_k2": "RCNP",
}


@pytest.fixture(scope="module")
def scored_sdf(spark):
    return spark.createDataFrame(SCORED).cache()


def _pairs(df) -> set:
    return {(r["id1"], r["id2"]) for r in df.collect()}


class TestSparkPruning:
    @pytest.mark.parametrize("case", list(EXPECTED))
    def test_hand_computed_retention(self, scored_sdf, case):
        kwargs, want = EXPECTED[case]
        got = _pairs(_SPARK_FNS[case](scored_sdf, **kwargs))
        assert got == want

    def test_no_valid_pairs_all_empty(self, spark):
        low = spark.createDataFrame(
            pd.DataFrame({"id1": [1, 2], "id2": [11, 12], "p": [0.1, 0.49]})
        )
        for fn, kw in [(bcl, {}), (wep, {}), (wnp, {}), (rwnp, {}),
                       (blast, {}), (cep, {"K": 5}), (cnp, {"k": 2}),
                       (rcnp, {"k": 2})]:
            assert _pairs(fn(low, **kw)) == set()

    def test_exactly_half_probability_is_valid(self, spark):
        sdf = spark.createDataFrame(
            pd.DataFrame({"id1": [1], "id2": [11], "p": [0.5]})
        )
        assert _pairs(bcl(sdf)) == {(1, 11)}

    def test_cardinality_tie_break_is_deterministic(self, spark):
        ties = spark.createDataFrame(
            pd.DataFrame(
                {"id1": [1, 2, 3], "id2": [11, 11, 11], "p": [0.8, 0.8, 0.8]}
            )
        )
        # k=1 for entity 11: (1,11) wins on the (p desc, id1, id2) order.
        got = _pairs(rcnp(ties, k=1))
        assert got == {(1, 11)}
        assert _pairs(cep(ties, K=2)) == {(1, 11), (2, 11)}


class TestLocalEngineEquivalence:
    @pytest.mark.parametrize("case", list(EXPECTED))
    def test_local_matches_spark_semantics(self, case):
        kwargs, want = EXPECTED[case]
        algo = _LOCAL_NAME.get(case, case)
        got = set(
            prune_local(SCORED, algo, **kwargs)[["id1", "id2"]].apply(tuple, axis=1)
        )
        assert got == want

    def test_local_unknown_algorithm(self):
        with pytest.raises(ValueError):
            prune_local(SCORED, "NOPE")


class TestAlgorithmRelations:
    """Set-algebra invariants the paper relies on (Section 3)."""

    def test_rwnp_subset_of_wnp(self, scored_sdf):
        assert _pairs(rwnp(scored_sdf)) <= _pairs(wnp(scored_sdf))

    def test_rcnp_subset_of_cnp(self, scored_sdf):
        assert _pairs(rcnp(scored_sdf, k=1)) <= _pairs(cnp(scored_sdf, k=1))

    def test_everything_subset_of_bcl(self, scored_sdf):
        valid = _pairs(bcl(scored_sdf))
        for fn, kw in [(wep, {}), (wnp, {}), (rwnp, {}), (blast, {}),
                       (cep, {"K": 3}), (cnp, {"k": 1}), (rcnp, {"k": 1})]:
            assert _pairs(fn(scored_sdf, **kw)) <= valid

    def test_cep_respects_K(self, scored_sdf):
        for K in [0, 1, 2, 3, 4, 5, 99]:
            assert len(_pairs(cep(scored_sdf, K=K))) == min(K, 5)

    def test_wnp_keeps_max_edge_per_entity(self, scored_sdf):
        """Every entity's own maximum edge beats its mean, so each entity
        with a valid edge survives in WNP's output."""
        kept = _pairs(wnp(scored_sdf))
        entities = {e for p in kept for e in p}
        valid_entities = {1, 2, 3, 11, 12, 13}
        assert entities == valid_entities
