"""Tests for the shared experiment driver utilities."""
import json

import numpy as np
import pandas as pd
import pytest

from repro.experiments import FULL_BUDGETS, dump_results, load_streams


class TestFullBudgets:
    def test_matches_paper_sweep(self):
        # "We swept the oracle budget from 500 to 5000 in increments of 500."
        assert FULL_BUDGETS == tuple(range(500, 5001, 500))


class TestLoadStreams:
    def test_all_six_datasets(self):
        streams = load_streams(n_records=2_000, seg_len=500)
        assert len(streams) == 6
        assert all(s.n_records == 2_000 for s in streams.values())

    def test_cached_identity(self):
        a = load_streams(n_records=2_000, seg_len=500)
        b = load_streams(n_records=2_000, seg_len=500)
        assert a is b  # lru_cache: one materialisation per process

    def test_distinct_scales_distinct_objects(self):
        a = load_streams(n_records=2_000, seg_len=500)
        b = load_streams(n_records=2_500, seg_len=500)
        assert a is not b


class TestDumpResults:
    def test_dataframe_roundtrip(self, tmp_path):
        df = pd.DataFrame({"a": [1.0, 2.0], "b": ["x", "y"]})
        path = tmp_path / "out.json"
        dump_results(df, path)
        payload = json.loads(path.read_text())
        assert payload["columns"] == ["a", "b"]
        assert payload["data"] == [[1.0, "x"], [2.0, "y"]]

    def test_dict_of_frames(self, tmp_path):
        obj = {
            "summary": pd.DataFrame({"v": [1]}),
            "detail": pd.DataFrame({"w": [2.5]}),
        }
        path = tmp_path / "nested" / "out.json"
        dump_results(obj, path)
        payload = json.loads(path.read_text())
        assert set(payload) == {"summary", "detail"}

    def test_creates_parent_dirs(self, tmp_path):
        path = tmp_path / "a" / "b" / "c.json"
        dump_results(pd.DataFrame({"x": [1]}), path)
        assert path.exists()

    def test_nan_serialised(self, tmp_path):
        df = pd.DataFrame({"x": [np.nan, 1.0]})
        path = tmp_path / "out.json"
        dump_results(df, path)
        assert json.loads(path.read_text())["data"][0] == [None]


class TestJobsImportable:
    @pytest.mark.parametrize(
        "module",
        [
            "table2_datasets",
            "table3_no_predicate",
            "table4_predicate",
            "lesion_study",
            "adversarial_shifts",
            "sensitivity",
            "proxy_quality",
            "cost_savings",
            "streaming_demo",
        ],
    )
    def test_entrypoint_importable(self, module):
        # Jobs must at least import and expose main() — guards against
        # bit-rot in the spark-submit entrypoints without running Spark.
        import importlib.util
        import pathlib
        import sys

        jobs = pathlib.Path(__file__).resolve().parent.parent / "jobs"
        sys.path.insert(0, str(jobs))
        try:
            spec = importlib.util.spec_from_file_location(module, jobs / f"{module}.py")
            mod = importlib.util.module_from_spec(spec)
            spec.loader.exec_module(mod)
            assert callable(mod.main)
        finally:
            sys.path.remove(str(jobs))
