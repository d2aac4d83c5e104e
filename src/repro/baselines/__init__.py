"""Baselines: NFA-guided online traversals and graph-engine stand-ins."""
