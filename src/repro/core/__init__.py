"""Core contribution of the paper: BMCs and constant-time cost estimation."""
