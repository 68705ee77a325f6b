"""Spark embedding: curve UDFs, distributed estimator init, layout writer."""
