"""Walk state, transition models, bucket management, reference walker."""
