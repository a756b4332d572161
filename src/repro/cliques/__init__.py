"""Distributed h-clique enumeration and clique-degrees."""
