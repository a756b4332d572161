"""Graph substrate: canonical edge DataFrames, ops, generators, datasets."""
