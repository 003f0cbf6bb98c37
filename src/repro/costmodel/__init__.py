"""Dollar-cost and runtime models for the simulated cloud (paper SII-B).

``pricing`` applies the paper's published AWS prices to measured
:class:`~repro.s3sim.usage.Usage`. ``perf`` is the analytic runtime
model that turns measured byte/row counts into phase times with the
bandwidths of the paper's testbed (10 GigE r4.8xlarge against S3).
"""
from repro.costmodel.pricing import Pricing, CostBreakdown
from repro.costmodel.perf import PerfModel, Phase

__all__ = ["Pricing", "CostBreakdown", "PerfModel", "Phase"]
