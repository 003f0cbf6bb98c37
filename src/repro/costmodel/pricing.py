"""The paper's query cost model (SII-B), US East (N. Virginia) prices.

Components (storage cost is excluded, as in the paper):

* S3 Select data scan:     $0.002   per GB scanned
* S3 Select data return:   $0.0007  per GB returned
* HTTP requests (GET):     $0.0004  per 1,000 requests
* Data transfer:           free within-region (servers co-located)
* Compute:                 r4.8xlarge at $2.128 per hour, prorated
"""
from __future__ import annotations

from dataclasses import dataclass

from repro.s3sim.usage import Usage

GB = 1024 ** 3


@dataclass(frozen=True)
class Pricing:
    """Unit prices; defaults are the paper's published numbers."""

    scan_per_gb: float = 0.002
    return_per_gb: float = 0.0007
    per_1k_requests: float = 0.0004
    transfer_per_gb: float = 0.0  # within-region, like the paper's setup
    ec2_per_hour: float = 2.128   # r4.8xlarge

    def cost(self, usage: Usage, compute_seconds: float) -> "CostBreakdown":
        """Dollar cost of a query from its usage + (modeled) runtime."""
        return CostBreakdown(
            compute=compute_seconds / 3600.0 * self.ec2_per_hour,
            requests=usage.total_requests / 1000.0 * self.per_1k_requests,
            scan=usage.bytes_scanned / GB * self.scan_per_gb,
            transfer=(
                usage.bytes_returned / GB * self.return_per_gb
                + usage.bytes_transferred / GB * self.transfer_per_gb
            ),
        )


@dataclass(frozen=True)
class CostBreakdown:
    """The four cost components of Figure 1b etc., in dollars."""

    compute: float
    requests: float
    scan: float
    transfer: float

    @property
    def total(self) -> float:
        return self.compute + self.requests + self.scan + self.transfer

    def __add__(self, other: "CostBreakdown") -> "CostBreakdown":
        return CostBreakdown(
            compute=self.compute + other.compute,
            requests=self.requests + other.requests,
            scan=self.scan + other.scan,
            transfer=self.transfer + other.transfer,
        )

    def to_dict(self) -> dict:
        return {
            "compute": self.compute,
            "requests": self.requests,
            "scan": self.scan,
            "transfer": self.transfer,
            "total": self.total,
        }
