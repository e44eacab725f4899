"""E6 — scalability advantages of the actor model (Appendix B, Fig. 18).

Direct Source-Loader→Trainer transfer (Data Constructor disabled) vs
OVERLORD's constructor-mediated path at 1k/2k/4k GPUs. Expected shape:
modest gap at 1k, ~10x fetch-latency increase for the baseline at 2k,
and baseline collapse (unable to sustain training) at 4k while the
constructor path stays bounded.
"""
from __future__ import annotations

from repro.sim.netsim import ScalabilityPoint, actor_model_scalability

GPU_COUNTS = (1024, 2048, 4096)


def run(gpu_counts: tuple[int, ...] = GPU_COUNTS) -> list[ScalabilityPoint]:
    return actor_model_scalability(gpu_counts)
