"""Distributed graph substrate: model, SCC, transitive closure, condensation."""
