"""Figure 9's time/dollar cost model.

The paper prices a query by the GPU time its model invocations take on
an NVIDIA T4 (on-demand g4dn.xlarge): the Mask R-CNN oracle runs at
4 frames/s, the ResNet-18 proxy at 12,600 frames/s, and the instance
costs $0.526 per hour.  Proxy-based methods (stratified baseline, ABae,
InQuest) pay the proxy over *every* record plus the oracle over the
sampled records; uniform sampling pays only the oracle on its samples.
"""
from __future__ import annotations

from dataclasses import dataclass

__all__ = ["CostModel", "T4_COST_MODEL"]


@dataclass(frozen=True)
class CostModel:
    oracle_fps: float
    proxy_fps: float
    dollars_per_hour: float

    def query_seconds(
        self, *, oracle_calls: int, proxy_calls: int = 0
    ) -> float:
        """GPU seconds to run the stated number of model invocations."""
        if oracle_calls < 0 or proxy_calls < 0:
            raise ValueError("model invocation counts must be non-negative")
        return oracle_calls / self.oracle_fps + proxy_calls / self.proxy_fps

    def query_dollars(self, *, oracle_calls: int, proxy_calls: int = 0) -> float:
        """On-demand dollars for the same invocations."""
        return (
            self.query_seconds(oracle_calls=oracle_calls, proxy_calls=proxy_calls)
            / 3600.0
            * self.dollars_per_hour
        )


#: The paper's stated constants (Section 5.4).
T4_COST_MODEL = CostModel(oracle_fps=4.0, proxy_fps=12_600.0, dollars_per_hour=0.526)
