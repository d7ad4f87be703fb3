"""Experiment harnesses, one per table of the paper's evaluation section."""
from repro.experiments.table1 import (
    PAPER_TIERS,
    ThroughputRow,
    format_table1,
    measure_batch_algorithm,
    measure_online_stl,
    run_table1,
)
from repro.experiments.table2 import PAPER_TABLE2, Table2Row, format_table2, run_table2
from repro.experiments.table3 import (
    PAPER_MASE,
    PAPER_SMOOTH,
    format_table3,
    run_table3,
)
from repro.experiments.table4 import PAPER_TABLE4, format_table4, run_table4

__all__ = [
    "PAPER_TIERS",
    "ThroughputRow",
    "format_table1",
    "measure_batch_algorithm",
    "measure_online_stl",
    "run_table1",
    "PAPER_TABLE2",
    "Table2Row",
    "format_table2",
    "run_table2",
    "PAPER_MASE",
    "PAPER_SMOOTH",
    "format_table3",
    "run_table3",
    "PAPER_TABLE4",
    "format_table4",
    "run_table4",
]
