"""Multi-objective optimization: Pareto utilities, HMOOC, and baselines."""
