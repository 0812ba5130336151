"""PPQ-Trajectory reproduction (VLDB 2020, Wang & Ferhatosmanoglu).

Subpackages:
  core      -- E-PQ / PPQ quantizers, CQC coding, incremental partitioning.
  baselines -- product/residual quantization, Q-trajectory helper modes,
               TrajStore, REST.
  index     -- PI / TPI spatio-temporal indexes, ID-list codec, disk sim.
  queries   -- STRQ / TPQ / exact-match filtering.
  spark     -- distributed dataflow build + query execution.
  harness   -- one experiment harness per evaluation table (Tables 2-9).
"""

DEG_TO_M = 111_000.0
"""Meters per degree (the paper's eps_1 = 0.001 deg ~= 111 m conversion)."""
