"""End-to-end applications accelerated with ConnectIt (paper §5)."""
