"""Synthetic genome corpus and k-mer extraction (the NCBI-archive substitute)."""
from .generator import PAPER_2500, PAPER_3480, CorpusConfig, corpus_stats, genome_corpus
from .kmers import DEFAULT_K, extract_kmers, kmer_strings, sequence_codes

__all__ = [
    "PAPER_2500", "PAPER_3480", "CorpusConfig", "corpus_stats", "genome_corpus",
    "DEFAULT_K", "extract_kmers", "kmer_strings", "sequence_codes",
]
