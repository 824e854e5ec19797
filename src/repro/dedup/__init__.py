"""MinHash + LSH de-duplication (the paper's corpus preprocessing)."""
from .lsh import DedupResult, band_buckets, candidate_pairs, collision_probability, dedup_files
from .minhash import estimate_jaccard, exact_jaccard_pairs, minhash_signatures, signature_matrix

__all__ = [
    "DedupResult", "band_buckets", "candidate_pairs", "collision_probability",
    "dedup_files", "estimate_jaccard", "exact_jaccard_pairs", "minhash_signatures",
    "signature_matrix",
]
