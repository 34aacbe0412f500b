"""Baseline samplers (uniform, priority) and the shared sampler contract."""
