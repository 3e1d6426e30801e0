"""Ranking substrate: score computation and rank assignment in Spark."""

from repro.ranking.rankers import add_rank, normalized_score  # noqa: F401
