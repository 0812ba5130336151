"""Distributed dataflow: partition trajectories across executors, build
PPQ codebooks per partition with applyInPandas, query via DataFrame ops."""
