"""Iterative computation engines (Eq. 1 sync / Eq. 2 async) and algorithms."""
from repro.engine.algorithms import ALGOS, Algo, make_algo  # noqa: F401
from repro.engine.reference import gauss_seidel, jacobi  # noqa: F401
