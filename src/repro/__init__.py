"""PySpark reproduction of RAMBO (SIGMOD 2021).

Subpackages: ``sketch`` (hashing/Bloom/CMS/bitslice substrates), ``genomes``
(synthetic corpus + k-mer extraction), ``dedup`` (MinHash-LSH
preprocessing), ``core`` (BIGSI baseline, RAMBO, evaluation harness).
"""
