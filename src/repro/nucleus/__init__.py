"""The paper's core contribution: parallel (r, s) nucleus decomposition."""
from .decomp import DecompConfig, DecompResult, nucleus_decomposition  # noqa: F401
from .reference import reference_nucleus  # noqa: F401
