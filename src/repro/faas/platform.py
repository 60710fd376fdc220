"""Simulated FaaS platform configuration (AWS Lambda, paper §2.2/§4.2/§5.1).

Captures the service-level constraints Lambada designs around: valid memory
sizes, the concurrent-execution limit (default 1k, raised by support request
for the paper's experiments), and the invocation-rate limit (10x the
concurrency limit per second, which the paper shows is never binding for
single-query workloads).
"""
from __future__ import annotations

import dataclasses

from . import cpu_model


class ConcurrencyLimitExceeded(RuntimeError):
    """More concurrent workers requested than the account's limit allows."""


@dataclasses.dataclass(frozen=True)
class FaaSPlatform:
    """Account-level view of the function service."""

    #: Max concurrent function executions. AWS default is 1000; the paper had
    #: it raised via a support ticket ("handled within less than a day").
    concurrency_limit: int = 1000
    #: Invocations/second limit: "currently ten times the limit on the number
    #: of concurrent invocations" (§4.2).
    invocation_rate_multiplier: int = 10
    #: Function timeout (15 min at the time of the paper).
    timeout_s: float = 900.0

    @property
    def invocation_rate_limit(self) -> float:
        return self.concurrency_limit * self.invocation_rate_multiplier

    def check_fleet(self, n_workers: int, memory_mib: int) -> None:
        """Validate a worker fleet against service limits."""
        cpu_model.validate_memory(memory_mib)
        if n_workers < 1:
            raise ValueError("need at least one worker")
        if n_workers > self.concurrency_limit:
            raise ConcurrencyLimitExceeded(
                f"{n_workers} workers > concurrency limit {self.concurrency_limit}; "
                "raise the limit (support request) as the paper did"
            )


#: Account as configured for the paper's experiments (limit raised to 4k+).
PAPER_PLATFORM = FaaSPlatform(concurrency_limit=4096)
DEFAULT_PLATFORM = FaaSPlatform()
