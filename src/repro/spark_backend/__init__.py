"""Substrate: execution of the plan language on Apache Spark."""
