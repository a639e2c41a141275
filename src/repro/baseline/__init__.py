"""The paper's comparison baseline (zero budget, no optimisation)."""
from .full_load import full_load_store

__all__ = ["full_load_store"]
