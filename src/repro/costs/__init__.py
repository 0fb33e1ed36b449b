"""Seed-incentive (node seeding cost) models from §5.1."""
from repro.costs.incentives import COST_MODELS, seed_costs

__all__ = ["COST_MODELS", "seed_costs"]
