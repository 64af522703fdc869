"""Experiment harnesses reproducing the paper's evaluation section."""
from .accuracy import AccuracyConfig, format_accuracy, run_accuracy
from .querytime import QueryTimeConfig, format_querytime, run_querytime
from .table1 import PAPER_TABLE1, Table1Config, format_table1, run_table1
from .table2 import PAPER_TABLE2, Table2Config, format_table2, run_table2

__all__ = [
    "AccuracyConfig",
    "PAPER_TABLE1",
    "PAPER_TABLE2",
    "QueryTimeConfig",
    "Table1Config",
    "Table2Config",
    "format_accuracy",
    "format_querytime",
    "format_table1",
    "format_table2",
    "run_accuracy",
    "run_querytime",
    "run_table1",
    "run_table2",
]
