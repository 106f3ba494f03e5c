"""NumPy sparse linear-algebra substrate (scipy is not installed)."""
from .coo import SparseCOO
from .kmeans import lloyd
from .randsvd import eigsh_sym, matfree_eigsh, randomized_svd

__all__ = ["SparseCOO", "lloyd", "eigsh_sym", "matfree_eigsh", "randomized_svd"]
