"""End-to-end integration: miniature versions of the paper's experiments."""
import numpy as np
import pytest

from repro.experiments import adversarial_shifts, lesion, table2, table34
from repro.datasets.streams import DATASET_NAMES, SPECS, generate

_N, _SEG = 15_000, 3_000


@pytest.fixture(scope="module")
def streams():
    return {n: generate(n, n_records=_N, seg_len=_SEG) for n in DATASET_NAMES}


class TestTable2Pipeline:
    @pytest.fixture(scope="class")
    def t2(self, spark, streams):
        return table2(spark, streams)

    def test_all_datasets_present(self, t2):
        assert set(t2["dataset"]) == set(DATASET_NAMES)

    def test_measured_close_to_paper(self, t2):
        assert np.all(np.abs(t2["p"] - t2["p_paper"]) < 0.03)
        assert np.all(np.abs(t2["r"] - t2["r_paper"]) < 0.03)

    def test_columns(self, t2):
        assert list(t2.columns) == ["dataset", "p_paper", "p", "r_paper", "r"]


class TestTable34Pipeline:
    @pytest.fixture(scope="class")
    def t3(self, spark, streams):
        # Miniature Table 3: 2 budgets, modest trials — checks shape,
        # not headline factors (those need full scale; see EXPERIMENTS.md).
        return table34(
            spark,
            streams,
            mode="nopred",
            budgets=(300, 750),
            n_trials=40,
            highlight_budgets=(300, 750),
        )

    def test_summary_rows(self, t3):
        idx = set(t3["summary"].index)
        assert {"inquest", "uniform", "stratified", "abae"} <= idx

    def test_inquest_beats_uniform(self, t3):
        # The paper's central claim survives even at miniature scale.
        assert t3["summary"].loc["improvement_uniform", "All"] > 1.2

    def test_inquest_beats_fixed_stratified(self, t3):
        assert t3["summary"].loc["improvement_stratified", "All"] > 1.1

    def test_per_dataset_detail_complete(self, t3):
        per = t3["per_dataset"]
        assert set(per["dataset"]) == set(DATASET_NAMES)
        assert per["median_rmse"].gt(0).all()

    def test_full_query_detail_complete(self, t3):
        assert set(t3["full_query"]["dataset"]) == set(DATASET_NAMES)


class TestPredicatePipeline:
    def test_predicate_mode_runs_and_orders(self, spark, streams):
        out = table34(
            spark,
            {n: streams[n] for n in ("archie", "night-street")},
            mode="pred",
            budgets=(600,),
            n_trials=40,
            highlight_budgets=(600,),
        )
        summary = out["summary"]
        assert summary.loc["improvement_uniform", "All"] > 0.9
        assert (summary.loc[["inquest", "uniform", "stratified", "abae"]] > 0).all().all()


class TestLesionPipeline:
    def test_full_inquest_best_on_average(self, spark, streams):
        table = lesion(
            spark,
            {n: streams[n] for n in ("archie", "taipei")},
            budgets=(750,),
            n_trials=40,
        )
        # Removing both dynamic components should not beat full InQuest.
        assert (
            table.loc["stratified_pilot", "All"]
            >= table.loc["inquest", "All"] * 0.9
        )


class TestAdversarialPipeline:
    def test_shapes_and_positivity(self, spark):
        table = adversarial_shifts(
            spark,
            n_records=10_000,
            seg_len=2_000,
            streams_per_n=1,
            budget=500,
            n_trials=20,
        )
        assert list(table.columns) == [1, 2, 3, 4, 5]
        assert {"inquest", "uniform", "stratified", "abae"} <= set(table.index)
        assert (table > 0).all().all()
