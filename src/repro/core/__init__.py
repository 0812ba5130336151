"""Core PPQ-trajectory algorithms: predictors, quantizers, CQC, partitions."""
