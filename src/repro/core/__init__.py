"""The paper's primary contribution: Ball-tree substrate + Dask-means."""
