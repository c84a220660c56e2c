"""Demo-scenario analytics (S14): heatmap counts and activation curves.

Figures themselves are out of scope (per the reproduction brief); these
modules produce the *data* behind the paper's Figure 2 (node activation
heatmap) and Figure 3 (mean activated nodes over time) as Spark
DataFrames, each verified against the DuckDB oracle.
"""
from repro.analysis.heatmap import activation_counts_df
from repro.analysis.timeseries import mean_active_over_time_df

__all__ = ["activation_counts_df", "mean_active_over_time_df"]
