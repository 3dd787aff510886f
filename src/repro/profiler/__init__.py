"""Statistics Generator (paper §4.1, Table 6)."""
from .stats import ProfileStats, generate_stats, profile_with_full_gc

__all__ = ["ProfileStats", "generate_stats", "profile_with_full_gc"]
