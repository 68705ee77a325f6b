"""Storage substrate: block-packed curve-ordered store (PostgreSQL stand-in)."""
