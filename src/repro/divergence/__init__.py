"""Comparison baseline of Section VI-D: the divergence-based subgroup
detection of Pastor et al. [27]."""

from repro.divergence.pastor import divergence_subgroups  # noqa: F401
