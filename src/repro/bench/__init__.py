"""Workload definitions and experiment harnesses."""
