"""Spark-distributed Monte Carlo over (dataset, algorithm, budget, trial).

The per-trial kernels are sequential (reservoir sampling with state
carried across segments) so they run as numpy inside Spark tasks:
``run_trials`` broadcasts the materialised streams once, fans the trial
grid out with ``applyInPandas``, and returns a long-format DataFrame of
per-segment (and full-query) estimates next to their ground truths,
ready for the Spark SQL metric aggregations in ``repro.sparkops.metrics``.
"""
from __future__ import annotations

import functools
import itertools
import json

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from repro.core.abae import abae_trial
from repro.core.baselines import fixed_stratified_trial, uniform_trial
from repro.core.inquest import inquest_trial
from repro.datasets.streams import StreamData, segment_truths

__all__ = ["ALGORITHMS", "RESULT_SCHEMA", "run_trials"]

#: Algorithm registry: evaluation methods plus the Figure 7 lesion
#: variants of InQuest.
ALGORITHMS = {
    "inquest": inquest_trial,
    "uniform": uniform_trial,
    "stratified": fixed_stratified_trial,
    "abae": abae_trial,
    "inquest_fixed_alloc": functools.partial(inquest_trial, dynamic_alloc=False),
    "inquest_fixed_strata": functools.partial(inquest_trial, dynamic_strata=False),
    "stratified_pilot": functools.partial(
        inquest_trial, dynamic_strata=False, dynamic_alloc=False
    ),
}

RESULT_SCHEMA = (
    "dataset string, algo string, mode string, budget int, trial int, "
    "segment int, estimate double, truth double"
)


def _full_truth(stream: StreamData, *, predicate: bool) -> float:
    f, m = stream.statistic, stream.pred
    if predicate:
        return float(f[m].mean()) if m.any() else 0.0
    return float(f.mean())


def run_trials(
    spark: SparkSession,
    streams: dict[str, StreamData],
    *,
    algorithms: list[str],
    budgets: list[int],
    n_trials: int,
    modes: tuple[str, ...] = ("pred", "nopred"),
    params: dict | None = None,
    base_seed: int = 0,
    n_tasks: int | None = None,
) -> DataFrame:
    """Run the full trial grid on the cluster.

    ``params`` are extra keyword arguments forwarded to every kernel that
    accepts them (e.g. ``{"alpha": 0.5}`` for the sensitivity sweep —
    only applied to InQuest variants).  Output rows carry ``segment``
    in ``[0, T)`` for per-segment estimates and ``segment = -1`` for the
    full-query estimate, each next to its ground truth.
    """
    unknown = set(algorithms) - set(ALGORITHMS)
    if unknown:
        raise ValueError(f"unknown algorithms: {sorted(unknown)}")
    payload = {
        name: {
            "statistic": s.statistic,
            "pred": s.pred,
            "proxy": s.proxy,
            "seg_len": s.seg_len,
            "truth": {
                mode: segment_truths(s, predicate=(mode == "pred"))
                for mode in modes
            },
            "full_truth": {
                mode: _full_truth(s, predicate=(mode == "pred")) for mode in modes
            },
        }
        for name, s in streams.items()
    }
    bc = spark.sparkContext.broadcast(payload)
    params_json = json.dumps(params or {})

    if n_tasks is None:
        n_tasks = spark.sparkContext.defaultParallelism * 4
    grid = pd.DataFrame(
        [
            {
                "dataset": d,
                "algo": a,
                "mode": m,
                "budget": b,
                "trial": t,
                "params": params_json,
            }
            for d, a, m, b, t in itertools.product(
                streams, algorithms, modes, budgets, range(n_trials)
            )
        ]
    )
    # Round-robin task ids spread the grid evenly over the executors.
    grid["task"] = np.arange(len(grid)) % n_tasks
    grid_df = spark.createDataFrame(grid)

    def run_task(pdf: pd.DataFrame) -> pd.DataFrame:
        data = bc.value
        out: list[tuple] = []
        for row in pdf.itertuples(index=False):
            d = data[row.dataset]
            kernel = ALGORITHMS[row.algo]
            extra = json.loads(row.params)
            if extra and not row.algo.startswith(("inquest", "stratified_pilot")):
                extra = {}  # alpha/K knobs only exist on InQuest variants
            pred = (
                d["pred"]
                if row.mode == "pred"
                else np.ones(len(d["pred"]), dtype=bool)
            )
            seg_len = int(extra.pop("seg_len", d["seg_len"]))
            res = kernel(
                d["statistic"],
                pred,
                d["proxy"],
                seg_len=seg_len,
                total_budget=int(row.budget),
                seed=int(base_seed + row.trial),
                **extra,
            )
            truth = d["truth"][row.mode]
            n_seg = len(res["seg_estimates"])
            for t, est in enumerate(res["seg_estimates"]):
                # Truth arrays are per canonical seg_len; a seg_len
                # override (sensitivity sweep) recomputes truth inline.
                if n_seg == len(truth) and seg_len == d["seg_len"]:
                    tru = float(truth[t])
                else:
                    sl = slice(t * seg_len, (t + 1) * seg_len)
                    fseg, mseg = d["statistic"][sl], pred[sl]
                    tru = float(fseg[mseg].mean()) if mseg.any() else 0.0
                out.append(
                    (row.dataset, row.algo, row.mode, row.budget, row.trial, t, float(est), tru)
                )
            out.append(
                (
                    row.dataset,
                    row.algo,
                    row.mode,
                    row.budget,
                    row.trial,
                    -1,
                    float(res["full_estimate"]),
                    d["full_truth"][row.mode],
                )
            )
        return pd.DataFrame(
            out,
            columns=[
                "dataset",
                "algo",
                "mode",
                "budget",
                "trial",
                "segment",
                "estimate",
                "truth",
            ],
        )

    return grid_df.groupBy("task").applyInPandas(run_task, schema=RESULT_SCHEMA)
