"""Synthetic data: SBN pairs (§5.1) and open-data-like collections."""
from .collection import (
    collection_to_long_df,
    collection_to_pandas_long,
    pair_id_of,
    sbn_candidate_pairs,
    sbn_to_long_df,
)
from .opendata import Collection, make_collection, make_nyc_like, make_wbf_like
from .sbn import SBNPair, make_sbn_collection, make_sbn_pair

__all__ = [
    "Collection",
    "SBNPair",
    "collection_to_long_df",
    "collection_to_pandas_long",
    "make_collection",
    "make_nyc_like",
    "make_sbn_collection",
    "make_sbn_pair",
    "make_wbf_like",
    "pair_id_of",
    "sbn_candidate_pairs",
    "sbn_to_long_df",
]
