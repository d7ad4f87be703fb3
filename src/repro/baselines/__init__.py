"""Batch baselines the paper compares OnlineSTL against, plus their online
counterparts. ``REGISTRY`` maps the paper's algorithm names to uniform
``decompose(values, periods, **kw) -> Decomposition`` callables."""
from repro.baselines.mstl import mstl
from repro.baselines.online_wrapper import online_counterpart, online_update_times
from repro.baselines.robust_stl import robust_stl
from repro.baselines.ssa import ssa
from repro.baselines.stl import stl, stl_decompose
from repro.baselines.str_reg import str_decompose
from repro.baselines.tbats import tbats

# Names as the paper's tables print them. `stl` dispatches to MSTL for
# multi-period series; `robust_stl` is Fast-RobustSTL when given several
# periods — both matching the paper's "for datasets with multiple
# seasonality, Fast RobustSTL is used instead of RobustSTL".
REGISTRY = {
    "stl": stl,
    "SSA": ssa,
    "STR": str_decompose,
    "TBATS": tbats,
    "RobustSTL": robust_stl,
}

__all__ = [
    "REGISTRY",
    "mstl",
    "online_counterpart",
    "online_update_times",
    "robust_stl",
    "ssa",
    "stl",
    "stl_decompose",
    "str_decompose",
    "tbats",
]
