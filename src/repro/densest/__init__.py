"""Densest subgraph algorithms: Exact, CoreExact, PeelApp, IncApp, CoreApp."""
