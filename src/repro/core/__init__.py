"""Core Hamlet reproduction: query model, templates, engines, optimizer."""
