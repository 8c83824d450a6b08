"""Reproduction subpackage."""
