"""Incremental computation: revision deduction, Ingress engine, competitor models."""
