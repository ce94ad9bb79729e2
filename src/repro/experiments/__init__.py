"""Table-reproduction harnesses (T1-T6); see DESIGN.md section 4 for the
table-to-paper mapping and EXPERIMENTS.md for paper-vs-measured numbers."""
from . import t1_onedim, t2_md, t3_index, t4_cases, t5_parallel, t6_zillow  # noqa: F401

ALL_TABLES = {
    "t1": t1_onedim,
    "t2": t2_md,
    "t3": t3_index,
    "t4": t4_cases,
    "t5": t5_parallel,
    "t6": t6_zillow,
}
