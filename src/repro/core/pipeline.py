"""End-to-end Generalized Supervised Meta-blocking pipeline.

``prepare_dataset`` runs blocking + feature generation once per dataset,
caches the Spark feature frame *and* collects it to the driver (at most a few
hundred thousand rows at these scales): the pandas copy feeds the
deterministic training sampler and the sweep engine, while scoring and
pruning — the paper's contribution — run in Spark. ``run_method`` trains the
probabilistic classifier, scores every candidate pair with a Catalyst sigmoid
expression, applies one pruning algorithm and measures effectiveness and
run-time. RT covers training + scoring + pruning + evaluation (the paper's
Section 2.1 definition), not the one-off blocking.
"""
from __future__ import annotations

import time
from dataclasses import dataclass
from typing import Callable

import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from repro.blocking.pipeline import BlockCollection, build_blocks
from repro.classifier.logistic import LogisticModel, fit_logistic
from repro.classifier.training import sample_balanced
from repro.eval.metrics import Effectiveness, effectiveness
from repro.features.schemes import compute_features, columns_for
from repro.features.stats import GlobalStats
from repro.core import prune_weight, prune_cardinality

#: Default feature sets (paper Formulas 1 & 2 and the [21] baseline set).
FEATURES_21 = ("CF-IBF", "RACCB", "JS", "LCP")
FEATURES_BLAST = ("CF-IBF", "RACCB", "RS", "NRS")  # Formula 1 (paper set 78)
FEATURES_RCNP = ("CF-IBF", "RACCB", "JS", "LCP", "WJS")  # Formula 2 (set 187)


@dataclass
class DatasetArtifacts:
    """Blocking + feature artifacts shared by every method on a dataset."""

    name: str
    collection: BlockCollection
    features: DataFrame  # cached Spark frame: (id1, id2, 9 feature columns)
    features_pdf: pd.DataFrame  # driver copy for sampling / local engine
    gstats: GlobalStats
    ground_truth: DataFrame
    gt_pdf: pd.DataFrame
    n_candidates: int
    block_quality: Effectiveness

    @property
    def cep_K(self) -> int:
        """CEP's K = floor(sum of |b| / 2) (Section 3.2)."""
        return self.gstats.sum_block_sizes // 2

    @property
    def cnp_k(self) -> int:
        """CNP's k = max(1, floor(sum of |b| / #entities)) (Section 3.2)."""
        return max(1, self.gstats.sum_block_sizes // self.collection.n_entities)


@dataclass(frozen=True)
class MethodResult:
    """One (dataset, algorithm, feature set, training size, seed) run."""

    dataset: str
    algorithm: str
    feature_set: tuple[str, ...]
    n_train_per_class: int
    seed: int
    eff: Effectiveness
    runtime_s: float
    model: LogisticModel


def prepare_dataset(
    spark: SparkSession,
    name: str,
    entities: DataFrame,
    ground_truth: DataFrame,
    task: str,
) -> DatasetArtifacts:
    """Block the dataset, compute all 8 features once, cache + collect, and
    measure the input block collection's quality (paper Table 2)."""
    collection = build_blocks(entities, task)
    features, gstats = compute_features(collection)
    # Few, larger partitions: every candidate set here is <= a few hundred
    # thousand rows, where per-stage scheduling overhead dominates shuffles.
    features = features.repartition(8).cache()
    features_pdf = features.toPandas()  # one job; also warms the cache
    gt = ground_truth.select("id1", "id2").cache()
    gt_pdf = gt.toPandas()
    from repro.classifier.training import match_mask

    n_found = int(match_mask(features_pdf, gt_pdf).sum())
    block_quality = Effectiveness(
        n_pairs=len(features_pdf),
        n_matches_found=n_found,
        n_matches_total=len(gt_pdf),
    )
    return DatasetArtifacts(
        name=name,
        collection=collection,
        features=features,
        features_pdf=features_pdf,
        gstats=gstats,
        ground_truth=gt,
        gt_pdf=gt_pdf,
        n_candidates=len(features_pdf),
        block_quality=block_quality,
    )


def _pruner(
    algorithm: str, arts: DatasetArtifacts, blast_r: float
) -> Callable[[DataFrame], DataFrame]:
    if algorithm == "BCl":
        return prune_weight.bcl
    if algorithm == "WEP":
        return prune_weight.wep
    if algorithm == "WNP":
        return prune_weight.wnp
    if algorithm == "RWNP":
        return prune_weight.rwnp
    if algorithm == "BLAST":
        return lambda s: prune_weight.blast(s, r=blast_r)
    if algorithm == "CEP":
        return lambda s: prune_cardinality.cep(s, K=arts.cep_K)
    if algorithm == "CNP":
        return lambda s: prune_cardinality.cnp(s, k=arts.cnp_k)
    if algorithm == "RCNP":
        return lambda s: prune_cardinality.rcnp(s, k=arts.cnp_k)
    raise ValueError(f"unknown algorithm {algorithm!r}")


PRUNERS = ("BCl", "WEP", "WNP", "RWNP", "BLAST", "CEP", "CNP", "RCNP")


def score_pairs(features: DataFrame, model: LogisticModel) -> DataFrame:
    """Attach the matching probability ``p`` as a Catalyst expression."""
    return features.select("id1", "id2", model.as_spark_probability().alias("p"))


def resolve_n_train(arts: DatasetArtifacts, n_train_per_class: int) -> int:
    """Negative value selects the [21] rule: 5% of the positive class."""
    if n_train_per_class >= 0:
        return n_train_per_class
    return max(1, round(0.05 * arts.block_quality.n_matches_found))


def run_method(
    arts: DatasetArtifacts,
    algorithm: str,
    *,
    feature_set: tuple[str, ...],
    n_train_per_class: int,
    seed: int,
    blast_r: float = 0.35,
) -> MethodResult:
    """Train, score, prune, evaluate one configuration on one dataset."""
    cols = columns_for(feature_set)
    n_train_per_class = resolve_n_train(arts, n_train_per_class)
    t0 = time.perf_counter()
    X, y = sample_balanced(
        arts.features_pdf,
        arts.gt_pdf,
        cols,
        n_per_class=n_train_per_class,
        seed=seed,
    )
    model = fit_logistic(X, y, cols)
    scored = score_pairs(arts.features, model)
    retained = _pruner(algorithm, arts, blast_r)(scored)
    eff = effectiveness(  # single Spark job; forces execution
        retained, arts.ground_truth, n_total=arts.block_quality.n_matches_total
    )
    runtime = time.perf_counter() - t0
    return MethodResult(
        dataset=arts.name,
        algorithm=algorithm,
        feature_set=tuple(feature_set),
        n_train_per_class=n_train_per_class,
        seed=seed,
        eff=eff,
        runtime_s=runtime,
        model=model,
    )
