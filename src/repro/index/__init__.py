"""Spatio-temporal indexing: PI (Alg. 3), TPI (Alg. 4), disk simulation."""
