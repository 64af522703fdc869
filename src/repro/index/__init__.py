"""Inverted-index substrate for top-k join-correlation queries (§5.5)."""
from .inverted import IndexedSketch, InvertedIndex, QueryResult

__all__ = ["IndexedSketch", "InvertedIndex", "QueryResult"]
