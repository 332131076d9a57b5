"""Multi-level parallel hash table structures for clique data (paper §5.1-5.3)."""
from .clique_table import CliqueTable, TableConfig, make_table  # noqa: F401
from .packing import bits_for, pack, unpack  # noqa: F401
