"""The paper's lightweight cost estimator (Section V)."""
