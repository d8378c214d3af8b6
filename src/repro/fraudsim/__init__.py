"""Transaction-stream fraud simulator (case study, Table 9).

Stands in for Grab's production stream: fraud communities emit edge
bursts over time; a detector with latency L blocks a community's
remaining edges L seconds after the community becomes detectable. The
prevention ratio R is the blocked fraction — monotonically decreasing in
latency, which is the relationship Table 9 reports.
"""
from repro.fraudsim.stream import FraudStream, generate_stream
from repro.fraudsim.prevention import prevention_ratio

__all__ = ["FraudStream", "generate_stream", "prevention_ratio"]
