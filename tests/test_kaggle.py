"""Tests for the Kaggle schema-drift case study (Figure 15)."""
import numpy as np
import pandas as pd
import pytest

from repro.core.fmdv import FMDVConfig
from repro.kaggle.tasks import TASKS, apply_schema_drift, generate_task
from repro.kaggle.drift import run_task


class TestTaskGeneration:
    def test_eleven_tasks_like_paper(self):
        assert len(TASKS) == 11
        kinds = [t.kind for t in TASKS]
        assert kinds.count("classification") == 7
        assert kinds.count("regression") == 4

    def test_three_tasks_designed_undetectable(self):
        und = {t.name for t in TASKS if not t.detectable}
        assert und == {"WestNile", "WalmartTrips", "HomeDepot"}

    @pytest.mark.parametrize("task", TASKS, ids=lambda t: t.name)
    def test_generate_shapes(self, task):
        train, test = generate_task(task, seed=1)
        assert len(train) == task.n_train
        assert len(test) == task.n_test
        assert {f"cat_{i}" for i in range(len(task.cat_domains))} <= set(
            train.columns
        )
        assert "label" in train.columns

    def test_deterministic(self):
        t = TASKS[0]
        a, _ = generate_task(t, seed=3)
        b, _ = generate_task(t, seed=3)
        pd.testing.assert_frame_equal(a, b)

    def test_classification_labels_binary(self):
        train, _ = generate_task(TASKS[0], seed=1)
        assert set(train["label"].unique()) <= {0.0, 1.0}

    def test_swap_moves_columns(self):
        t = TASKS[0]
        _, test = generate_task(t, seed=1)
        drifted = apply_schema_drift(test, t)
        a, b = (f"cat_{t.swap[0]}", f"cat_{t.swap[1]}")
        assert (drifted[a] == test[b]).all()
        assert (drifted[b] == test[a]).all()

    def test_swap_preserves_other_columns(self):
        t = TASKS[0]
        _, test = generate_task(t, seed=1)
        drifted = apply_schema_drift(test, t)
        pd.testing.assert_series_equal(drifted["num_0"], test["num_0"])

    def test_labels_depend_on_categoricals(self):
        # shuffling a categorical column must change the implied signal:
        # verify values map to distinct signals via the label correlation
        t = TASKS[0]
        train, _ = generate_task(t, seed=2)
        by_val = train.groupby("cat_0")["label"].mean()
        assert by_val.max() - by_val.min() > 0.2


@pytest.mark.spark
@pytest.mark.slow
class TestRunTask:
    def test_detectable_task_end_to_end(self, spark, tiny_index):
        cfg = FMDVConfig(r=0.1, m=5)
        res = run_task(spark, TASKS[0], tiny_index, cfg, seed=1)
        assert res.score_clean > 0.6          # model learned something
        assert res.rel_drift < 0.98           # drift hurt quality
        assert res.detected                   # patterns differ -> caught
        assert not res.false_positive         # clean test passes

    def test_undetectable_task_not_flagged(self, spark, tiny_index):
        cfg = FMDVConfig(r=0.1, m=5)
        west_nile = next(t for t in TASKS if t.name == "WestNile")
        res = run_task(spark, west_nile, tiny_index, cfg, seed=1)
        assert not res.detected               # same-pattern swap invisible
        assert not res.false_positive
