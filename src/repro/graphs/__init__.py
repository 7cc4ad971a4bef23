"""Graph substrate (Spark + numpy CSR views) and synthetic dataset registry."""
