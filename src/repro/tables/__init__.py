"""Table harnesses reproducing the paper's evaluation tables."""
from . import paper_numbers
from .fmt import format_rows
from .table1 import table1_rows
from .table2 import table2_rows
from .table3 import table3_rows
from .table4 import table4_rows

__all__ = [
    "paper_numbers",
    "format_rows",
    "table1_rows",
    "table2_rows",
    "table3_rows",
    "table4_rows",
]
