"""PathEnum core: join model, light-weight index, enumerators, optimizer."""
