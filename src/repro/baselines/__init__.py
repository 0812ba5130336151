"""Baselines the paper compares against: PQ, RQ, TrajStore, REST.

Q-trajectory and E-PQ are obtained from ``repro.core.ppq.run_ppq`` flags
(no prediction / no partitioning respectively).
"""
