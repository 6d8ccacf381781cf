"""Figure 15 experiment: schema-drift impact on GBT quality, with and
without Auto-Validate data-validation.

Per task: train a Spark ML GBT (the paper used XGBoost; unavailable
offline — a GBDT is a GBDT for this purpose), score the clean test set
and the drifted test set (two categorical columns swapped), and run
FMDV-VH validation rules (learned per column from the training data)
against the drifted columns.  Report the relative quality drop and
whether validation caught the drift.
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Dict, List, Optional

import pandas as pd
from pyspark.ml import Pipeline
from pyspark.ml.evaluation import BinaryClassificationEvaluator, RegressionEvaluator
from pyspark.ml.feature import StringIndexer, VectorAssembler
from pyspark.ml.classification import GBTClassifier
from pyspark.ml.regression import GBTRegressor
from pyspark.sql import SparkSession

from repro.core.auto_validate import learn_rule
from repro.core.fmdv import FMDVConfig
from repro.core.index import PatternIndex
from repro.kaggle.tasks import KaggleTask, apply_schema_drift, generate_task


@dataclass
class TaskResult:
    name: str
    kind: str
    score_clean: float
    score_drift: float
    detected: bool
    false_positive: bool  # validation alarmed on the CLEAN test data
    designed_detectable: bool

    @property
    def rel_drift(self) -> float:
        """Drifted score normalized to the clean score (paper's bars)."""
        if self.score_clean <= 0:
            return 0.0
        return max(0.0, self.score_drift) / self.score_clean


def _build_pipeline(task: KaggleTask) -> Pipeline:
    cat_cols = [f"cat_{i}" for i in range(len(task.cat_domains))]
    stages = [
        StringIndexer(
            inputCol=c, outputCol=f"{c}_idx", handleInvalid="keep"
        )
        for c in cat_cols
    ]
    features = [f"{c}_idx" for c in cat_cols] + ["num_0", "num_1"]
    stages.append(VectorAssembler(inputCols=features, outputCol="features"))
    if task.kind == "classification":
        stages.append(
            GBTClassifier(labelCol="label", maxIter=15, maxDepth=4, maxBins=64, seed=7)
        )
    else:
        stages.append(
            GBTRegressor(labelCol="label", maxIter=15, maxDepth=4, maxBins=64, seed=7)
        )
    return Pipeline(stages=stages)


def _score(task: KaggleTask, model, df) -> float:
    pred = model.transform(df)
    if task.kind == "classification":
        # average precision proxy: area under the PR curve (paper
        # reports average-precision for classification tasks)
        ev = BinaryClassificationEvaluator(
            labelCol="label", metricName="areaUnderPR"
        )
    else:
        ev = RegressionEvaluator(labelCol="label", metricName="r2")
    return float(ev.evaluate(pred))


def _validate_drift(
    task: KaggleTask,
    train: pd.DataFrame,
    drifted: pd.DataFrame,
    index: PatternIndex,
    cfg: FMDVConfig,
) -> Dict[str, bool]:
    """Per categorical column: does its FMDV-VH rule alarm on the data?"""
    alarms = {}
    for i in range(len(task.cat_domains)):
        col = f"cat_{i}"
        rule = learn_rule(train[col].tolist(), index, cfg, "fmdv-vh")
        if rule is None:
            alarms[col] = False
            continue
        alarms[col] = not rule.validate(drifted[col].tolist())
    return alarms


def run_task(
    spark: SparkSession,
    task: KaggleTask,
    index: PatternIndex,
    cfg: FMDVConfig = FMDVConfig(),
    seed: int = 0,
) -> TaskResult:
    """Run the full Figure 15 protocol for one task."""
    train, test = generate_task(task, seed=seed)
    drifted = apply_schema_drift(test, task)

    train_df = spark.createDataFrame(train)
    model = _build_pipeline(task).fit(train_df)
    score_clean = _score(task, model, spark.createDataFrame(test))
    score_drift = _score(task, model, spark.createDataFrame(drifted))

    drift_alarms = _validate_drift(task, train, drifted, index, cfg)
    clean_alarms = _validate_drift(task, train, test, index, cfg)
    return TaskResult(
        name=task.name,
        kind=task.kind,
        score_clean=score_clean,
        score_drift=score_drift,
        detected=any(drift_alarms.values()),
        false_positive=any(clean_alarms.values()),
        designed_detectable=task.detectable,
    )


def run_all(
    spark: SparkSession,
    tasks,
    index: PatternIndex,
    cfg: FMDVConfig = FMDVConfig(),
    seed: int = 0,
) -> List[TaskResult]:
    return [run_task(spark, t, index, cfg, seed=seed) for t in tasks]
