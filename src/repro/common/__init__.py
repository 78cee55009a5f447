"""Shared low-level utilities (deterministic hashing)."""
