"""Sketching substrates: hashing, Bloom filter, count-min sketch, bitslice matrix."""
from .bitmatrix import BitMatrix
from .bloom import BloomFilter, bloom_rows, optimal_bits, optimal_eta
from .cms import CountMinSketch
from .hashing import decode_kmer, encode_kmers, hash64, random_kmer_codes, splitmix64

__all__ = [
    "BitMatrix", "BloomFilter", "CountMinSketch", "bloom_rows", "optimal_bits",
    "optimal_eta", "decode_kmer", "encode_kmers", "hash64", "random_kmer_codes",
    "splitmix64",
]
