"""ABae (Kang et al., PVLDB 2021) — the batch-setting comparator.

ABae sees the *entire* dataset's proxy scores before sampling (its
batch-setting advantage): it stratifies globally by proxy quantiles,
spends a pilot fraction of the total budget evenly across strata to
estimate ``p_k`` and ``sigma_k``, then allocates the remaining budget by
the optimal ``|D_k| sqrt(p_k) sigma_k`` rule.  We run it as the paper
does (Section 5.1): ``K = 3``, 15% pilot, *sample reuse* (pilot samples
count toward the final estimate).

Per-segment estimates — needed for the median-segment-RMSE metric —
restrict ABae's global sample to each segment and reweight by
within-segment ``p_hat_tk |D_tk|``, exactly the procedure described in
Section 5.2.
"""
from __future__ import annotations

import numpy as np

from .allocation import estimated_allocation, stratum_stats
from .estimator import StratumSample, get_prediction, segment_estimate
from .inquest import segment_slices
from .sampling import (
    cap_and_redistribute,
    largest_remainder_round,
    uniform_without_replacement,
)
from .stratify import assign_strata, quantile_boundaries

__all__ = ["abae_trial"]


def abae_trial(
    f: np.ndarray,
    pred: np.ndarray,
    proxy: np.ndarray,
    *,
    seg_len: int,
    total_budget: int,
    seed: int = 0,
    k: int = 3,
    pilot_frac: float = 0.15,
) -> dict:
    """One ABae trial over a materialised dataset."""
    f = np.asarray(f, dtype=np.float64)
    pred = np.asarray(pred, dtype=bool)
    proxy = np.asarray(proxy, dtype=np.float64)
    rng = np.random.default_rng([seed, 0])

    boundaries = quantile_boundaries(proxy, k)
    strata = assign_strata(proxy, boundaries)
    d_sizes = np.bincount(strata, minlength=k)

    # Stage 1 — pilot: even split of pilot_frac * budget across strata.
    pilot_budget = max(k, int(round(pilot_frac * total_budget)))
    pilot_each = largest_remainder_round(np.ones(k), pilot_budget)
    pilot_each = cap_and_redistribute(pilot_each, d_sizes)
    pilot_idx_by_stratum = []
    for k_ in range(k):
        members = np.flatnonzero(strata == k_)
        pilot_idx_by_stratum.append(
            uniform_without_replacement(rng, members, pilot_each[k_])
        )
    pilot_idx = np.concatenate(pilot_idx_by_stratum)

    # Allocation estimate from the pilot (optimal |D_k| sqrt(p_k) sigma_k
    # rule); uniform fallback when the pilot is uninformative.
    stats = stratum_stats(f[pilot_idx], pred[pilot_idx], strata[pilot_idx], k)
    alloc = estimated_allocation(d_sizes, stats["p_hat"], stats["sigma_hat"])
    if alloc is None:
        alloc = np.full(k, 1.0 / k)

    # Stage 2 — allocate the remainder, excluding already-drawn records.
    stage2_budget = max(0, total_budget - int(pilot_each.sum()))
    remaining = d_sizes - pilot_each
    stage2 = cap_and_redistribute(
        largest_remainder_round(alloc, stage2_budget), remaining
    )
    all_idx_by_stratum = []
    for k_ in range(k):
        members = np.flatnonzero(strata == k_)
        unused = np.setdiff1d(members, pilot_idx_by_stratum[k_], assume_unique=True)
        drawn = uniform_without_replacement(rng, unused, stage2[k_])
        # Sample reuse: the final estimator sees pilot + stage-2 samples.
        all_idx_by_stratum.append(np.concatenate([pilot_idx_by_stratum[k_], drawn]))

    # Full-query estimate from global strata.
    global_cells = [
        StratumSample(f=f[ix], pred=pred[ix], d_size=int(d_sizes[k_]))
        for k_, ix in enumerate(all_idx_by_stratum)
    ]

    # Per-segment estimates: restrict the sample to each segment.
    slices = segment_slices(len(f), seg_len)
    seg_estimates = []
    for sl in slices:
        cells_t = []
        for k_, ix in enumerate(all_idx_by_stratum):
            in_seg = ix[(ix >= sl.start) & (ix < sl.stop)]
            members_in_seg = int(
                np.count_nonzero(strata[sl.start : sl.stop] == k_)
            )
            cells_t.append(
                StratumSample(f=f[in_seg], pred=pred[in_seg], d_size=members_in_seg)
            )
        seg_estimates.append(segment_estimate(cells_t))

    return {
        "seg_estimates": np.asarray(seg_estimates),
        "full_estimate": get_prediction(global_cells),
        "oracle_calls": int(sum(len(ix) for ix in all_idx_by_stratum)),
    }
